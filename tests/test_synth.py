"""Synthetic mask generator tests (dataset substitute, DESIGN.md §3)."""
import numpy as np
import pytest

from repro.masks.synth import (
    IMAGENET_LITE,
    TINY,
    WILDS_LITE,
    DatasetSpec,
    generate_mask,
    object_bbox,
    pred_class,
)


class TestDatasetSpec:
    def test_n_masks(self):
        assert TINY.n_masks == TINY.n_images * 2

    def test_mask_id_bijection(self):
        seen = set()
        for img in range(5):
            for model in TINY.model_ids:
                mid = TINY.mask_id(img, model)
                assert mid not in seen
                seen.add(mid)
        assert seen == set(range(10))

    def test_benchmark_specs_grid_compatible(self):
        # 7x7 CHI grids as in the paper's configs (DESIGN.md §3)
        assert WILDS_LITE.width % 16 == 0 and WILDS_LITE.width // 16 == 7
        assert IMAGENET_LITE.width % 8 == 0 and IMAGENET_LITE.width // 8 == 8


class TestGenerateMask:
    @pytest.mark.parametrize("image_id,model_id", [(0, 1), (0, 2), (7, 1), (59, 2)])
    def test_deterministic(self, image_id, model_id):
        a = generate_mask(TINY, image_id, model_id)
        b = generate_mask(TINY, image_id, model_id)
        assert np.array_equal(a, b)

    @pytest.mark.parametrize("image_id", [0, 3, 11])
    def test_values_in_unit_interval_exclusive(self, image_id):
        m = generate_mask(TINY, image_id, 1)
        assert m.dtype == np.float32
        assert float(m.min()) >= 0.0
        assert float(m.max()) < 1.0  # paper's data model: [0, 1)

    def test_shape(self):
        m = generate_mask(TINY, 0, 1)
        assert m.shape == (TINY.height, TINY.width)

    def test_models_differ_but_correlate(self):
        m1 = generate_mask(TINY, 4, 1)
        m2 = generate_mask(TINY, 4, 2)
        assert not np.array_equal(m1, m2)
        other = generate_mask(TINY, 5, 1)
        corr_same = np.corrcoef(m1.ravel(), m2.ravel())[0, 1]
        corr_other = np.corrcoef(m1.ravel(), other.ravel())[0, 1]
        assert corr_same > corr_other

    def test_images_differ(self):
        assert not np.array_equal(generate_mask(TINY, 0, 1), generate_mask(TINY, 1, 1))

    def test_spatially_coherent_not_iid(self):
        """Neighbouring pixels must correlate (the structure CHI exploits)."""
        m = generate_mask(TINY, 2, 1).astype(np.float64)
        horiz = np.corrcoef(m[:, :-1].ravel(), m[:, 1:].ravel())[0, 1]
        assert horiz > 0.5


class TestObjectBbox:
    @pytest.mark.parametrize("image_id", range(10))
    def test_within_bounds(self, image_id):
        x1, y1, x2, y2 = object_bbox(TINY, image_id)
        assert 0 <= x1 < x2 <= TINY.width
        assert 0 <= y1 < y2 <= TINY.height

    def test_deterministic(self):
        assert object_bbox(TINY, 3) == object_bbox(TINY, 3)

    def test_covers_reasonable_area(self):
        areas = []
        for i in range(50):
            x1, y1, x2, y2 = object_bbox(TINY, i)
            areas.append((x2 - x1) * (y2 - y1) / (TINY.width * TINY.height))
        assert 0.15 < np.mean(areas) < 0.7

    def test_varies_across_images(self):
        boxes = {object_bbox(TINY, i) for i in range(20)}
        assert len(boxes) > 10


class TestPredClass:
    def test_deterministic_and_in_range(self):
        for i in range(20):
            c = pred_class(TINY, i)
            assert c == pred_class(TINY, i)
            assert 0 <= c < 10

    def test_multiple_classes_present(self):
        assert len({pred_class(TINY, i) for i in range(60)}) >= 5
