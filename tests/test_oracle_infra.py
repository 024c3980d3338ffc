"""Sanity tests for the shared test infrastructure: the DuckDB oracle,
the pixel explosion, and the provided TPC-H-lite generators."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data, testing
from repro.oracle import assert_equivalent


class TestPixelsTable:
    def test_row_count(self, pixels, tiny_store):
        s = tiny_store.spec
        assert len(pixels) == s.n_masks * s.width * s.height

    def test_values_match_masks(self, pixels, tiny_store):
        sub = pixels[pixels["mask_id"] == 13]
        m = tiny_store.load_mask(13)
        got = np.zeros_like(m, dtype=np.float64)
        got[sub["y"], sub["x"]] = sub["v"]
        assert np.array_equal(got, m.astype(np.float64))

    def test_oracle_detects_wrong_result(self, spark, pixels, tiny_meta):
        """A deliberately wrong Spark result must fail the oracle."""
        wrong = spark.createDataFrame(pd.DataFrame({"mask_id": [0, 1]}), "mask_id long")
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT DISTINCT mask_id FROM meta WHERE model_id = 1 ORDER BY mask_id",
                pixels=pixels,
                meta=tiny_meta,
            )

    def test_oracle_accepts_correct_result(self, spark, tiny_meta):
        got = spark.createDataFrame(
            tiny_meta.loc[tiny_meta["model_id"] == 1, ["mask_id"]], "mask_id long"
        )
        assert_equivalent(
            got,
            "SELECT mask_id FROM meta WHERE model_id = 1",
            meta=tiny_meta,
        )


class TestTpchLiteOracle:
    """Smoke tests that the provided synth_data + oracle plumbing works
    (used as the repo's generic correctness harness)."""

    def test_lineitem_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = (
            li.groupBy("l_returnflag")
            .agg(F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty"))
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 2) AS qty "
            "FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )

    def test_orders_join(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS n FROM lineitem, orders "
            "WHERE l_orderkey = o_orderkey GROUP BY o_orderpriority",
            lineitem=li,
            orders=o,
        )
