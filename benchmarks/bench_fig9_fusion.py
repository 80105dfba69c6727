"""Figure 9 (§8.2.2) — OP fusion + reordering effect.

The 14-OP recipe (5 mappers, 8 filters — 5 fusible — 1 dedup) runs with
and without fusion. Paper: up to 24.91% total-time saving.
"""
import pytest

from repro.core.pipeline import Pipeline
from repro.recipes import FUSION_BENCH_RECIPE

_RESULTS: dict[str, float] = {}


def _run(df, mode):
    return Pipeline(FUSION_BENCH_RECIPE, mode=mode).run(df).count()


@pytest.mark.benchmark(group="fig9-fusion")
def test_unfused(benchmark, cc_df):
    _run(cc_df, "lazy")  # warm-up
    benchmark.pedantic(lambda: _run(cc_df, "lazy"), rounds=2, iterations=1)
    _RESULTS["unfused"] = benchmark.stats.stats.mean


@pytest.mark.benchmark(group="fig9-fusion")
def test_fused(benchmark, cc_df):
    _run(cc_df, "fused")  # warm-up
    benchmark.pedantic(lambda: _run(cc_df, "fused"), rounds=2, iterations=1)
    _RESULTS["fused"] = benchmark.stats.stats.mean
    if "unfused" in _RESULTS:
        saved = 100 * (1 - _RESULTS["fused"] / _RESULTS["unfused"])
        print(f"\n[fig9] fusion saves {saved:.1f}% (paper: up to 24.91%)")
        # Fusion must never make things materially slower.
        assert _RESULTS["fused"] < _RESULTS["unfused"] * 1.1
