"""Figure 10 (as a table): distribution of CHI bounds vs index
granularity and value range. Writes ``results/fig10_bound_tightness.md``.

Paper shape: larger (finer) indexes give tighter bounds (shorter
vertical segments) and lower FML for the same count threshold; the
value range and the data both shift the distribution.
"""
import pandas as pd
import pytest

from repro import harness


@pytest.mark.parametrize("dataset", ["wilds_lite", "imagenet_lite"])
def test_bound_tightness(benchmark, spark, dataset, request):
    request.getfixturevalue(
        "wilds_engine" if dataset == "wilds_lite" else "imagenet_engine"
    )
    pdf = benchmark.pedantic(
        lambda: harness.run_bound_tightness(spark, dataset, n_masks=1000),
        rounds=1,
        iterations=1,
    )
    # finer index => tighter mean relative width, per value range
    for (lv, uv), sub in pdf.groupby(["lv", "uv"]):
        fine = sub[sub["index"].str.startswith("fine")]["mean_rel_width"].iloc[0]
        coarse = sub[sub["index"].str.startswith("coarse")]["mean_rel_width"].iloc[0]
        assert fine <= coarse
    prev = getattr(test_bound_tightness, "_acc", [])
    prev.append(pdf)
    test_bound_tightness._acc = prev


def test_write_fig10(benchmark):
    def _write():
        acc = getattr(test_bound_tightness, "_acc", [])
        if not acc:
            return None
        return harness.save_markdown(
            pd.concat(acc, ignore_index=True),
            "fig10_bound_tightness.md",
            "Figure 10 — bound tightness vs index granularity and value range",
        )

    benchmark.pedantic(_write, rounds=1, iterations=1)
