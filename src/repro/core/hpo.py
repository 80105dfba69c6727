"""HPO for data processing (paper Sec. 5.1.2).

Offline substitute for W&B Sweeps: random search with optional Bayesian-
flavoured exploitation (perturb the incumbent), and a Hyperband-style
successive-halving scheduler with progressive early stopping. Search
spaces are dicts mapping parameter name to either a (low, high) float
range or a tuple of choices. Objectives are maximized.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Any, Callable, Mapping, Sequence

import numpy as np

Space = Mapping[str, Any]


def _sample(space: Space, rng: np.random.Generator) -> dict[str, Any]:
    params: dict[str, Any] = {}
    for name, spec in space.items():
        if isinstance(spec, tuple) and len(spec) == 2 and all(
            isinstance(x, (int, float)) and not isinstance(x, bool) for x in spec
        ):
            lo, hi = spec
            if isinstance(lo, int) and isinstance(hi, int):
                params[name] = int(rng.integers(lo, hi + 1))
            else:
                params[name] = float(rng.uniform(lo, hi))
        elif isinstance(spec, (list, tuple)):
            params[name] = spec[int(rng.integers(0, len(spec)))]
        else:
            raise ValueError(f"bad space spec for {name!r}: {spec!r}")
    return params


def _perturb(params: dict, space: Space, rng: np.random.Generator, scale: float = 0.2) -> dict:
    out = dict(params)
    for name, spec in space.items():
        if isinstance(spec, tuple) and len(spec) == 2 and all(
            isinstance(x, (int, float)) and not isinstance(x, bool) for x in spec
        ):
            lo, hi = spec
            width = (hi - lo) * scale
            val = float(out[name]) + float(rng.normal(0.0, width))
            val = min(max(val, lo), hi)
            out[name] = int(round(val)) if isinstance(lo, int) and isinstance(hi, int) else val
    return out


@dataclass
class Trial:
    params: dict
    value: float
    budget: float | None = None


@dataclass
class SweepResult:
    trials: list[Trial] = field(default_factory=list)

    @property
    def best(self) -> Trial:
        return max(self.trials, key=lambda t: t.value)

    def importance(self) -> dict[str, float]:
        """|Pearson correlation| of each numeric param with the metric —
        the paper's "correlations and importance scores" view."""
        if len(self.trials) < 3:
            return {}
        out = {}
        ys = np.array([t.value for t in self.trials], dtype=float)
        for name in self.trials[0].params:
            xs = [t.params[name] for t in self.trials]
            if not all(isinstance(x, (int, float)) and not isinstance(x, bool) for x in xs):
                continue
            xa = np.array(xs, dtype=float)
            if xa.std() == 0 or ys.std() == 0:
                out[name] = 0.0
            else:
                out[name] = float(abs(np.corrcoef(xa, ys)[0, 1]))
        return out


def random_search(
    objective: Callable[[dict], float],
    space: Space,
    n_trials: int = 20,
    seed: int = 0,
    exploit_after: int = 5,
) -> SweepResult:
    """Random search that, after ``exploit_after`` trials, alternates
    uniform exploration with perturbations of the incumbent (a cheap
    stand-in for Bayesian optimization's exploitation behaviour)."""
    rng = np.random.default_rng(seed)
    result = SweepResult()
    for i in range(n_trials):
        if i >= exploit_after and i % 2 == 0 and result.trials:
            params = _perturb(result.best.params, space, rng)
        else:
            params = _sample(space, rng)
        result.trials.append(Trial(params, float(objective(params))))
    return result


def hyperband(
    objective: Callable[[dict, float], float],
    space: Space,
    max_budget: float = 27.0,
    eta: int = 3,
    seed: int = 0,
) -> SweepResult:
    """Successive halving à la Hyperband (single bracket, s = s_max).

    Starts ``eta**s_max`` configurations at budget ``max_budget/eta**s_max``
    and promotes the top ``1/eta`` fraction with ``eta×`` the budget until
    one configuration reaches ``max_budget``.
    """
    rng = np.random.default_rng(seed)
    s_max = int(math.floor(math.log(max_budget, eta)))
    n = eta ** s_max
    budget = max_budget / (eta ** s_max)
    configs = [_sample(space, rng) for _ in range(n)]
    result = SweepResult()
    while configs:
        scored = []
        for params in configs:
            value = float(objective(params, budget))
            trial = Trial(params, value, budget)
            result.trials.append(trial)
            scored.append(trial)
        scored.sort(key=lambda t: t.value, reverse=True)
        keep = max(1, len(scored) // eta)
        if len(configs) == 1 or budget >= max_budget:
            break
        configs = [t.params for t in scored[:keep]]
        budget = min(budget * eta, max_budget)
    return result
