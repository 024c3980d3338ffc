"""spark-submit entrypoint: materialise the benchmark datasets
(WILDS-lite, ImageNet-lite) and their CHI indexes under ``data/``.

Usage: spark-submit jobs/gen_data.py
"""
from pyspark.sql import DataFrame, SparkSession

from repro import harness
from repro.core.chi import ChiIndex


def run(spark: SparkSession) -> DataFrame:
    """Build both stores + indexes; return a summary DataFrame."""
    rows = []
    for name in ("wilds_lite", "imagenet_lite"):
        store = harness.get_store(spark, name)
        _, cfg = harness.DATASETS[name]
        path = harness.ensure_index(spark, store, cfg)
        idx = ChiIndex.load(spark, path, cfg)
        rows.append(
            (
                name,
                store.spec.n_images,
                store.n_masks(),
                f"{store.spec.width}x{store.spec.height}",
                cfg.tag(),
                store.raw_bytes(),
                idx.nbytes(),
                round(idx.nbytes() / store.raw_bytes(), 4),
            )
        )
    return spark.createDataFrame(
        rows,
        "dataset string, n_images long, n_masks long, mask_size string, "
        "chi_config string, raw_bytes long, index_bytes long, index_ratio double",
    )


if __name__ == "__main__":
    spark = harness.job_session("gen_data")
    df = run(spark)
    df.show(truncate=False)
    harness.save_markdown(df.toPandas(), "datasets.md", "Benchmark datasets and index sizes")
    spark.stop()
