"""Figures 8 + 9 (as tables): MaskSearch's time distribution across
randomized Filter/Top-K/Aggregation queries, and the Pearson correlation
between query time and the fraction of masks loaded (FML). Writes
``results/fig8_query_type_distribution.md`` and
``results/fig9_fml_correlation.md``.

Paper shape: all query types finish far below baseline time with spread
driven by FML; Pearson r(time, FML) = 0.99 (WILDS) / 0.96 (ImageNet).
"""
import pytest

from repro import harness

_PER_QUERY = {}


@pytest.mark.parametrize("dataset", ["wilds_lite", "imagenet_lite"])
def test_query_types(benchmark, spark, dataset, request):
    # materialise store+index outside the timed region
    request.getfixturevalue(
        "wilds_engine" if dataset == "wilds_lite" else "imagenet_engine"
    )
    n_filter, n_topk, n_agg = (30, 10, 8) if dataset == "wilds_lite" else (20, 6, 5)
    pdf = benchmark.pedantic(
        lambda: harness.run_query_types(
            spark, dataset, n_filter=n_filter, n_topk=n_topk, n_agg=n_agg
        ),
        rounds=1,
        iterations=1,
    )
    _PER_QUERY[dataset] = pdf
    assert set(pdf["query_type"]) == {"filter", "topk", "agg"}
    assert (pdf["fml"] <= 1.0).all() and (pdf["fml"] >= 0.0).all()


def test_write_fig8(benchmark):
    import pandas as pd

    def _write():
        if not _PER_QUERY:
            return None
        allq = pd.concat(_PER_QUERY.values(), ignore_index=True)
        return harness.save_markdown(
            harness.summarize_query_types(allq),
            "fig8_query_type_distribution.md",
            "Figure 8 — MaskSearch query-time distribution by query type (s)",
        )

    benchmark.pedantic(_write, rounds=1, iterations=1)


def test_fig9_fml_correlation(benchmark, spark, wilds_engine):
    """Figure 9 lives in the simulated-EBS regime, where mask loading
    dominates query time (paper: Pearson r = 0.99 on WILDS)."""
    pdf = benchmark.pedantic(
        lambda: harness.run_query_types(
            spark, "wilds_lite", n_filter=20, n_topk=0, n_agg=0, io_delay_ms=40.0
        ),
        rounds=1,
        iterations=1,
    )
    corr = harness.fml_time_correlation(pdf)
    harness.save_markdown(
        corr,
        "fig9_fml_correlation.md",
        "Figure 9 — correlation between query time and fraction of masks loaded",
    )
    assert (corr["pearson_r_time_vs_fml"] > 0.6).all()
