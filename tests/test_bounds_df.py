"""The pure-DataFrame filter stage (Spark scan over the CHI Parquet)
must agree with the driver-side in-memory index path."""
import numpy as np
import pytest

from repro.core.cp import OBJECT_ROI, CPTerm
from repro.core.executor import bounds_df


@pytest.mark.parametrize(
    "term",
    [
        CPTerm(0.5, 1.0, (5, 5, 20, 20)),
        CPTerm(0.25, 0.75, (8, 8, 24, 32)),
        CPTerm(0.8, 1.0, OBJECT_ROI),
        CPTerm(0.1, 0.4, None),
    ],
)
def test_spark_bounds_match_driver_bounds(
    spark, tiny_store, tiny_index_path, tiny_cfg, engine, term
):
    sdf = bounds_df(spark, tiny_index_path, tiny_store, term, tiny_cfg)
    got = sdf.toPandas().sort_values("mask_id").reset_index(drop=True)
    meta = engine.target()
    lb, ub = engine.bounds(meta, term)
    expect = (
        meta.assign(lb=lb, ub=ub)[["mask_id", "lb", "ub"]]
        .sort_values("mask_id")
        .reset_index(drop=True)
    )
    assert np.array_equal(got["mask_id"].to_numpy(), expect["mask_id"].to_numpy())
    assert np.array_equal(got["lb"].to_numpy(), expect["lb"].to_numpy())
    assert np.array_equal(got["ub"].to_numpy(), expect["ub"].to_numpy())


def test_bounds_df_row_count(spark, tiny_store, tiny_index_path, tiny_cfg):
    sdf = bounds_df(spark, tiny_index_path, tiny_store, CPTerm(0.5, 1.0, None), tiny_cfg)
    assert sdf.count() == tiny_store.n_masks()
