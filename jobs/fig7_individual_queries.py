"""spark-submit entrypoint reproducing Figure 7 as a table: end-to-end
individual query execution time (Q1-Q5, both datasets, MaskSearch vs the
full-scan baseline class).

Usage: spark-submit jobs/fig7_individual_queries.py
"""
from pyspark.sql import DataFrame, SparkSession

from repro import harness


def run(spark: SparkSession) -> DataFrame:
    import pandas as pd

    # Three regimes: raw local I/O; the simulated-EBS mode (40 ms
    # per-mask load latency) that reproduces the paper's I/O-bound
    # setting where query time ~ masks loaded; and a near-asymptotic
    # 200 ms regime (Q3/Q4, ImageNet-lite only) where the time ratio
    # converges to the mask-load ratio, the paper's headline factor
    # (DESIGN.md §3).
    parts = []
    for delay in (0.0, 40.0):
        for ds in ("wilds_lite", "imagenet_lite"):
            parts.append(
                harness.run_individual_queries(spark, ds, io_delay_ms=delay, repeats=2)
            )
    parts.append(
        harness.run_individual_queries(
            spark, "imagenet_lite", io_delay_ms=200.0, query_names=("Q3", "Q4")
        )
    )
    pdf = pd.concat(parts, ignore_index=True)
    piv = pdf.pivot_table(
        index=["dataset", "io_delay_ms", "query"], columns="method", values="time_s"
    ).reset_index()
    piv["speedup_x"] = (piv["fullscan"] / piv["masksearch"]).round(1)
    harness.save_markdown(
        piv, "fig7_individual_query_times.md", "Figure 7 — individual query times (s)"
    )
    return spark.createDataFrame(piv)


if __name__ == "__main__":
    spark = harness.job_session("fig7")
    run(spark).show(truncate=False)
    spark.stop()
