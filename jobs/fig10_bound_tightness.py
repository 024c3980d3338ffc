"""spark-submit entrypoint reproducing Figure 10 as a table: bound
tightness (and the FML induced by count thresholds) for combinations of
(dataset, index granularity, pixel value range) over 1000 sampled masks
with object-bounding-box ROIs.

Usage: spark-submit jobs/fig10_bound_tightness.py
"""
from pyspark.sql import DataFrame, SparkSession

from repro import harness


def run(spark: SparkSession) -> DataFrame:
    import pandas as pd

    parts = [
        harness.run_bound_tightness(spark, ds, n_masks=1000)
        for ds in ("wilds_lite", "imagenet_lite")
    ]
    pdf = pd.concat(parts, ignore_index=True)
    harness.save_markdown(
        pdf,
        "fig10_bound_tightness.md",
        "Figure 10 — bound tightness vs index granularity and value range",
    )
    return spark.createDataFrame(pdf)


if __name__ == "__main__":
    spark = harness.job_session("fig10")
    run(spark).show(truncate=False)
    spark.stop()
