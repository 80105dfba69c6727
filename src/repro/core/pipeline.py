"""Pipeline executor — runs a recipe's OP list over a dataset.

Three execution modes reproduce the paper's performance story:

* ``eager_cache`` — one full pass **and a cache materialization per OP**,
  the Huggingface-datasets / RedPajama-script execution model the paper
  compares against (and the substrate for checkpoint/cache recovery);
* ``lazy``        — the whole OP list compiles to one Catalyst plan,
  evaluated in a single job (the paper's lazy unification);
* ``fused``       — ``lazy`` after OP fusion + reordering (Sec. 7).

The executor optionally traces per-OP changes (:class:`Tracer`) and
reports per-OP wall times (``profile=True`` forces an action per OP —
only for measurement runs, it defeats laziness by design).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame

from repro.core import fusion
from repro.core.base import Op
from repro.core.checkpoint import CacheManager
from repro.core.config import Recipe
from repro.core.tracer import Tracer

EXEC_MODES = ("lazy", "fused", "eager_cache")


@dataclass
class RunReport:
    """Execution metadata: the effective OP list and per-OP timings."""

    mode: str
    ops: list[str] = field(default_factory=list)
    op_seconds: dict[str, float] = field(default_factory=dict)
    total_seconds: float = 0.0
    cache_paths: list[str] = field(default_factory=list)


class Pipeline:
    """Executes an OP list (or Recipe) over a unified dataset."""

    def __init__(
        self,
        ops: list[Op] | Recipe,
        mode: str | None = None,
        tracer: Tracer | None = None,
        cache: CacheManager | None = None,
        profile: bool = False,
    ):
        if isinstance(ops, Recipe):
            self.recipe: Recipe | None = ops
            self.ops = ops.build_ops()
            mode = mode or ops.exec_mode
        else:
            self.recipe = None
            self.ops = list(ops)
        self.mode = mode or "fused"
        if self.mode not in EXEC_MODES:
            raise ValueError(f"unknown exec mode {self.mode!r}; one of {EXEC_MODES}")
        if self.mode == "eager_cache" and cache is None:
            raise ValueError("eager_cache mode requires a CacheManager")
        self.tracer = tracer
        self.cache = cache
        self.profile = profile
        self.report = RunReport(mode=self.mode)

    def effective_ops(self) -> list[Op]:
        """The OP list actually executed (post-fusion in fused mode)."""
        if self.mode == "fused":
            return fusion.optimize(self.ops)
        return list(self.ops)

    def run(self, df: DataFrame) -> DataFrame:
        t0 = time.perf_counter()
        ops = self.effective_ops()
        self.report = RunReport(mode=self.mode, ops=[op.name for op in ops])
        spark = df.sparkSession
        if self.mode == "eager_cache":
            # Per-OP materialization: cache the loaded dataset (step 0)
            # then one cache set per OP — the A.2 cache-mode layout.
            path = self.cache.save(df, 0, "load")
            self.report.cache_paths.append(path)
            df = self.cache.load(spark, path)
            for i, op in enumerate(ops, start=1):
                df = self._apply(op, df)
                path = self.cache.save(df, i, op.name)
                self.report.cache_paths.append(path)
                df = self.cache.load(spark, path)
        else:
            for op in ops:
                df = self._apply(op, df)
        self.report.total_seconds = time.perf_counter() - t0
        return df

    def _apply(self, op: Op, df: DataFrame) -> DataFrame:
        before = df
        t0 = time.perf_counter()
        out = op(df)
        if self.profile:
            out = out.cache()
            out.count()  # force evaluation to attribute time to this OP
        self.report.op_seconds[op.name] = (
            self.report.op_seconds.get(op.name, 0.0) + time.perf_counter() - t0
        )
        if self.tracer is not None:
            self.tracer.trace(op, before, out)
        return out


def run_recipe(
    df: DataFrame,
    recipe: Recipe,
    mode: str | None = None,
    cache: CacheManager | None = None,
    tracer: Tracer | None = None,
) -> tuple[DataFrame, RunReport]:
    """One-shot helper: execute ``recipe`` over ``df``."""
    pipe = Pipeline(recipe, mode=mode, cache=cache, tracer=tracer)
    out = pipe.run(df)
    return out, pipe.report
