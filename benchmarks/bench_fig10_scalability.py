"""Figure 10 (§8.2.3) — scalability: parallelism sweep (cores as the
multi-node proxy) vs the Beam-like serialized-loading configuration.
Paper: near-proportional scaling on Ray (up to 87.4% time reduction at
16 nodes); flat curve on Beam.
"""
import pytest

from repro.core.config import override
from repro.core.pipeline import Pipeline
from repro.recipes import PRETRAIN_REFINE

_RECIPE = override(PRETRAIN_REFINE, drop_ops=("document_dedup", "minhash_dedup"),
                   name="scalability")
_RESULTS: dict[str, float] = {}


def _run(df, parallelism, beam_like=False):
    # coalesce(n) narrows the scan+compute stage to n tasks (see the
    # fig10 job for why repartition(n) would not limit parallelism).
    shaped = df.coalesce(1 if beam_like else parallelism)
    return Pipeline(_RECIPE, mode="fused").run(shaped).count()


@pytest.mark.benchmark(group="fig10-scalability")
@pytest.mark.parametrize("nodes", [1, 4, 16])
def test_ray_like_scaling(benchmark, cc_df, nodes):
    _run(cc_df, nodes)  # warm-up
    benchmark.pedantic(lambda: _run(cc_df, nodes), rounds=2, iterations=1)
    _RESULTS[f"ray_{nodes}"] = benchmark.stats.stats.mean
    if nodes == 16 and "ray_1" in _RESULTS:
        # More workers must help substantially (paper: up to 87.4%).
        assert _RESULTS["ray_16"] < _RESULTS["ray_1"]


@pytest.mark.benchmark(group="fig10-scalability")
@pytest.mark.parametrize("nodes", [1, 16])
def test_beam_like_flat(benchmark, cc_df, nodes):
    _run(cc_df, nodes, beam_like=True)  # warm-up
    benchmark.pedantic(lambda: _run(cc_df, nodes, beam_like=True), rounds=2, iterations=1)
    _RESULTS[f"beam_{nodes}"] = benchmark.stats.stats.mean
    if nodes == 16 and "beam_1" in _RESULTS:
        # The Beam-like curve stays flat: loading dominates.
        ratio = _RESULTS["beam_16"] / _RESULTS["beam_1"]
        assert 0.5 < ratio < 2.0
