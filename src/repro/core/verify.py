"""Exact-evaluation kernels shared by the verification stage and the
full-scan baselines.

Both load masks through the ``maskstore`` DataSourceV2 (so Catalyst
pushes the ``mask_id IN (...)`` predicate into the file scan) and
compute exact CP values with Arrow-vectorised ``mapInPandas`` /
``applyInPandas`` kernels. The *only* difference between MaskSearch and
the baselines is which ``mask_id`` set reaches these functions.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.chi import ChiConfig, build_chi_array
from repro.core.cp import CPTerm, cp, intersect_threshold
from repro.maskstore import datasource
from repro.maskstore.store import MaskStore


#: Above this candidate-set size, ids are shipped via the ``maskids``
#: datasource option instead of a Catalyst ``In`` literal list, whose
#: analysis cost grows with the literal count (seconds at ~10^4 ids).
IN_FILTER_MAX = 1024


def _target_scan(spark: SparkSession, store: MaskStore, meta: pd.DataFrame):
    """Store scan restricted to exactly ``meta``'s masks, choosing the
    cheapest correct pruning mechanism:

    - full dataset          -> plain scan (nothing to prune);
    - whole model groups    -> pushed ``model_id IN`` filter;
    - small arbitrary set   -> pushed ``mask_id IN`` filter (Catalyst
      DSv2 pushdown, the paper's verification path);
    - large arbitrary set   -> ``maskids`` option (same file pruning,
      no giant literal list for Catalyst to analyse).

    Every path opens exactly ``len(meta)`` mask files.
    """
    datasource.register(spark)  # idempotent; callers may not have yet
    delay = getattr(store, "io_delay_ms", 0.0)
    n = len(meta)
    if n == store.n_masks():
        return datasource.scan(spark, store.root, io_delay_ms=delay)
    models = sorted(int(v) for v in meta["model_id"].unique())
    n_per_model = store.spec.n_images
    if n == n_per_model * len(models) and (
        meta.groupby("model_id").size() == n_per_model
    ).all():
        df = datasource.scan(spark, store.root, io_delay_ms=delay)
        return df.where(F.col("model_id").isin(models))
    ids = [int(v) for v in meta["mask_id"]]
    if n <= IN_FILTER_MAX:
        df = datasource.scan(spark, store.root, io_delay_ms=delay)
        return df.where(F.col("mask_id").isin(ids))
    return datasource.scan(spark, store.root, io_delay_ms=delay, mask_ids=ids)


def _term_params(meta: pd.DataFrame, terms, w: int, h: int) -> dict:
    """Per-mask resolved (x1, y1, x2, y2, lv, uv) for every term."""
    return {
        int(r.mask_id): [
            (
                *t.resolve_roi(w, h, (r.obj_x1, r.obj_y1, r.obj_x2, r.obj_y2)),
                t.lv,
                t.uv,
            )
            for t in terms
        ]
        for r in meta.itertuples()
    }


def exact_cp_pdf(
    spark: SparkSession,
    store: MaskStore,
    meta: pd.DataFrame,
    terms: tuple[CPTerm, ...],
) -> pd.DataFrame:
    """Load the masks in ``meta`` and compute exact CP per term.

    Returns ``mask_id, image_id, cp_0..cp_{n-1}`` (pandas; one row per
    mask). The store scan opens exactly ``len(meta)`` files thanks to
    the pushed-down ``In`` filter.
    """
    cols = [f"cp_{i}" for i in range(len(terms))]
    empty = pd.DataFrame({c: pd.Series(dtype=np.int64) for c in ["mask_id", "image_id", *cols]})
    if len(meta) == 0:
        return empty
    params = _term_params(meta, terms, store.spec.width, store.spec.height)
    bc = spark.sparkContext.broadcast(params)
    df = _target_scan(spark, store, meta)
    schema = "mask_id long, image_id long, " + ", ".join(f"{c} long" for c in cols)

    def _kernel(batches):
        prm = bc.value
        for pdf in batches:
            rows = []
            for mid, img, hh, ww, vals in zip(
                pdf["mask_id"], pdf["image_id"], pdf["height"], pdf["width"], pdf["values"]
            ):
                mask = np.asarray(vals, dtype=np.float32).reshape(hh, ww)
                cps = [
                    cp(mask, (x1, y1, x2, y2), lv, uv)
                    for (x1, y1, x2, y2, lv, uv) in prm[int(mid)]
                ]
                rows.append((int(mid), int(img), *cps))
            yield pd.DataFrame(rows, columns=["mask_id", "image_id", *cols])

    out = df.mapInPandas(_kernel, schema=schema).toPandas()
    bc.unpersist()
    return out if len(out) else empty


def exact_maskagg_pdf(
    spark: SparkSession,
    store: MaskStore,
    meta: pd.DataFrame,
    t: float,
    term: CPTerm,
) -> pd.DataFrame:
    """Exact per-image ``CP(INTERSECT(masks >= t), roi, (lv, uv))`` via a
    grouped ``applyInPandas``: each image's masks are intersected where
    they land after the shuffle. Returns ``image_id, val``."""
    if len(meta) == 0:
        return pd.DataFrame(
            {"image_id": pd.Series(dtype=np.int64), "val": pd.Series(dtype=np.int64)}
        )
    w, h = store.spec.width, store.spec.height
    rois = {
        int(r.image_id): term.resolve_roi(w, h, (r.obj_x1, r.obj_y1, r.obj_x2, r.obj_y2))
        for r in meta.itertuples()
    }
    bc = spark.sparkContext.broadcast((rois, t, term.lv, term.uv))
    df = _target_scan(spark, store, meta)

    def _agg(pdf: pd.DataFrame) -> pd.DataFrame:
        rois_b, tt, lv, uv = bc.value
        img = int(pdf["image_id"].iat[0])
        masks = [
            np.asarray(v, dtype=np.float32).reshape(hh, ww)
            for v, hh, ww in zip(pdf["values"], pdf["height"], pdf["width"])
        ]
        m = intersect_threshold(masks, tt)
        return pd.DataFrame({"image_id": [img], "val": [cp(m, rois_b[img], lv, uv)]})

    out = (
        df.groupBy("image_id")
        .applyInPandas(_agg, schema="image_id long, val long")
        .toPandas()
    )
    bc.unpersist()
    return out


def exact_cp_and_chi(
    spark: SparkSession,
    store: MaskStore,
    meta: pd.DataFrame,
    terms: tuple[CPTerm, ...],
    cfg: ChiConfig,
    chi_ids=None,
) -> tuple[pd.DataFrame, np.ndarray, np.ndarray]:
    """Incremental-indexing kernel (§3.6): one pass that loads each mask
    and computes exact CPs, additionally building the CHI for the masks
    in ``chi_ids`` (default: all). This lets MS-II answer a query with a
    *single* scan covering both first-touch masks (CP + CHI) and
    already-indexed masks that need verification (CP only). Returns
    ``(cp_pdf, chi_mask_ids, H_tensor)``; ``cp_pdf`` covers every mask in
    ``meta``, the CHI outputs only ``chi_ids``.
    """
    cols = [f"cp_{i}" for i in range(len(terms))]
    nx, ny = cfg.grid(store.spec.width, store.spec.height)
    empty_H = np.zeros((0, ny + 1, nx + 1, cfg.b), dtype=np.int64)
    if len(meta) == 0:
        empty = pd.DataFrame(
            {c: pd.Series(dtype=np.int64) for c in ["mask_id", "image_id", *cols]}
        )
        return empty, np.zeros(0, dtype=np.int64), empty_H
    chi_set = (
        frozenset(int(v) for v in meta["mask_id"])
        if chi_ids is None
        else frozenset(int(v) for v in chi_ids)
    )
    params = _term_params(meta, terms, store.spec.width, store.spec.height)
    bc = spark.sparkContext.broadcast((params, chi_set))
    df = _target_scan(spark, store, meta)
    wc, hc, b = cfg.wc, cfg.hc, cfg.b
    schema = (
        "mask_id long, image_id long, "
        + ", ".join(f"{c} long" for c in cols)
        + ", h array<long>"
    )

    def _kernel(batches):
        prm, chis = bc.value
        local_cfg = ChiConfig(wc, hc, b)
        for pdf in batches:
            rows = []
            for mid, img, hh, ww, vals in zip(
                pdf["mask_id"], pdf["image_id"], pdf["height"], pdf["width"], pdf["values"]
            ):
                mask = np.asarray(vals, dtype=np.float32).reshape(hh, ww)
                cps = [
                    cp(mask, (x1, y1, x2, y2), lv, uv)
                    for (x1, y1, x2, y2, lv, uv) in prm[int(mid)]
                ]
                h_out = (
                    build_chi_array(mask, local_cfg).ravel().tolist()
                    if int(mid) in chis
                    else []
                )
                rows.append((int(mid), int(img), *cps, h_out))
            yield pd.DataFrame(rows, columns=["mask_id", "image_id", *cols, "h"])

    out = df.mapInPandas(_kernel, schema=schema).toPandas()
    bc.unpersist()
    with_chi = out[out["h"].map(len) > 0]
    H = (
        np.stack(
            [np.asarray(x, dtype=np.int64).reshape(ny + 1, nx + 1, b) for x in with_chi["h"]]
        )
        if len(with_chi)
        else empty_H
    )
    chi_mask_ids = with_chi["mask_id"].to_numpy(np.int64)
    return out.drop(columns=["h"]), chi_mask_ids, H
