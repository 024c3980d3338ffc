"""Synthetic saliency-mask generator (dataset substitute, see DESIGN.md §3).

The paper evaluates on GradCAM saliency maps for WILDS and ImageNet
images, two ResNet-50 models per image, with YOLOv5 foreground-object
bounding boxes used as mask-specific ROIs. None of that is available
offline, so this module synthesises the statistical structure those
pipelines produce and that MaskSearch's index exploits:

- masks are *spatially coherent* (mixtures of 2-D Gaussians, not iid
  noise), values in ``[0, 1)``;
- per image there is a foreground-object box; "faithful" model masks
  concentrate salient blobs inside it, "spurious" masks (the paper's
  motivating failure mode) concentrate them in the background;
- the two models per image are correlated but not identical (model 2
  perturbs model 1's blob layout), so cross-model aggregation queries
  (Q4/Q5) are non-trivial;
- every quantity is deterministic in ``(dataset seed, mask_id)`` via
  ``np.random.default_rng([seed, mask_id])``, so distributed generation
  is order-independent and reproducible.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.cp import ROI

#: Fraction of images whose model-1 mask is "spurious" (background
#: focused), mirroring the paper's motivating scenarios.
SPURIOUS_FRACTION = 0.3
N_CLASSES = 10


@dataclass(frozen=True)
class DatasetSpec:
    """Shape of a synthetic mask dataset.

    ``n_images`` images, each with one mask per model in ``model_ids``
    (the paper's datasets use two ResNet-50 variants). Masks are
    ``width`` x ``height``; mask_ids are assigned as
    ``image_id * len(model_ids) + model_index``.
    """

    name: str
    n_images: int
    width: int
    height: int
    model_ids: tuple[int, ...] = (1, 2)
    seed: int = 0

    @property
    def n_masks(self) -> int:
        return self.n_images * len(self.model_ids)

    def mask_id(self, image_id: int, model_id: int) -> int:
        return image_id * len(self.model_ids) + self.model_ids.index(model_id)


def object_bbox(spec: DatasetSpec, image_id: int) -> ROI:
    """Synthetic foreground-object box for an image (YOLOv5 substitute).

    Covers 20-60 % of the image area, deliberately *not* aligned to any
    CHI grid, so mask-specific-ROI queries exercise the inner/outer
    available-region machinery.
    """
    g = np.random.default_rng([spec.seed, 1_000_003, image_id])
    w, h = spec.width, spec.height
    bw = int(round(w * g.uniform(0.45, 0.78)))
    bh = int(round(h * g.uniform(0.45, 0.78)))
    bw, bh = max(2, min(bw, w - 1)), max(2, min(bh, h - 1))
    x1 = int(g.integers(0, w - bw + 1))
    y1 = int(g.integers(0, h - bh + 1))
    return (x1, y1, x1 + bw, y1 + bh)


def pred_class(spec: DatasetSpec, image_id: int) -> int:
    """Synthetic predicted class label (used to form workload subsets)."""
    g = np.random.default_rng([spec.seed, 2_000_003, image_id])
    return int(g.integers(0, N_CLASSES))


def _blob_field(
    h: int, w: int, centers: np.ndarray, sigmas: np.ndarray, amps: np.ndarray
) -> np.ndarray:
    ys = np.arange(h, dtype=np.float64)[:, None]
    xs = np.arange(w, dtype=np.float64)[None, :]
    acc = np.zeros((h, w), dtype=np.float64)
    for (cy, cx), s, a in zip(centers, sigmas, amps):
        acc += a * np.exp(-(((ys - cy) ** 2) + ((xs - cx) ** 2)) / (2 * s * s))
    return acc


def generate_mask(spec: DatasetSpec, image_id: int, model_id: int) -> np.ndarray:
    """Deterministic synthetic saliency map, float32 in ``[0, 1)``."""
    mask_id = spec.mask_id(image_id, model_id)
    g_img = np.random.default_rng([spec.seed, 3_000_017, image_id])
    spurious = g_img.random() < SPURIOUS_FRACTION
    x1, y1, x2, y2 = object_bbox(spec, image_id)
    h, w = spec.height, spec.width

    n_blobs = int(g_img.integers(2, 6))
    if spurious:
        # Background-focused: centers drawn anywhere, biased to borders.
        cy = g_img.uniform(0, h, n_blobs)
        cx = g_img.uniform(0, w, n_blobs)
    else:
        cy = g_img.uniform(y1, y2, n_blobs)
        cx = g_img.uniform(x1, x2, n_blobs)
    centers = np.stack([cy, cx], axis=1)
    sigmas = g_img.uniform(0.06, 0.22, n_blobs) * min(h, w)
    amps = g_img.uniform(0.45, 1.0, n_blobs)

    # Model-specific perturbation on top of the shared image layout, so
    # the two masks of an image agree broadly but differ locally.
    g_mask = np.random.default_rng([spec.seed, 4_000_037, mask_id])
    centers = centers + g_mask.normal(0, 0.04 * min(h, w), centers.shape)
    amps = np.clip(amps * g_mask.uniform(0.75, 1.25, n_blobs), 0.05, 1.4)

    field = _blob_field(h, w, centers, sigmas, amps)
    field += 0.04 * g_mask.random((h, w))
    out = np.clip(field, 0.0, 1.0 - 1e-4).astype(np.float32)
    # float32 rounding of the clip bound must still stay below 1.0.
    return np.minimum(out, np.float32(1.0 - 1e-4))


#: Scaled-down stand-ins for the paper's two dataset/model pairs
#: (paper: WILDS 22,275 images 448x448; ImageNet 1,331,167 images
#: 224x224; both with 2 models). Grid geometry of the paper's CHI
#: configs is preserved by the companion configs in workloads/queries.py.
WILDS_LITE = DatasetSpec("wilds_lite", n_images=1200, width=112, height=112, seed=7)
IMAGENET_LITE = DatasetSpec("imagenet_lite", n_images=4000, width=64, height=64, seed=11)
#: Tiny dataset for unit tests (oracle-checkable pixel explosion).
TINY = DatasetSpec("tiny", n_images=60, width=32, height=32, seed=3)
