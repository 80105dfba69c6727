"""Operator (OP) base classes — paper Sec. 4 / Appendix A.1.

Four categories, mirroring Listing 1 of the paper but expressed as
DataFrame → DataFrame transformations so Catalyst can optimize them:

* :class:`Formatter`     — ``load_dataset(...) -> DataFrame`` (unify formats)
* :class:`Mapper`        — in-place text editing (single/multi sample)
* :class:`Filter`        — ``compute_stats`` + ``process`` (conditional removal),
  with the stats/predicate decoupling the paper highlights: the Analyzer
  reuses ``stats_exprs`` over the whole dataset, and OP fusion merges the
  stats of several Filters into a single projection.
* :class:`Deduplicator`  — dataset-level duplicate removal.

Filters declare *contexts* — named shared intermediate expressions
(tokenized words, split lines) reproducing the paper's context manager
(Sec. 7): fused filters evaluate each context once per sample.
"""
from __future__ import annotations

from typing import Callable, Mapping

from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import schema

# ---------------------------------------------------------------------------
# Shared contexts (paper: "segmented words, split lines, and others")
# ---------------------------------------------------------------------------

#: name -> builder(text Column) -> Column. Fused OPs compute each needed
#: context exactly once; standalone OPs inline them per use.
CONTEXT_BUILDERS: dict[str, Callable[[Column], Column]] = {
    # Words: lowercase, split on whitespace, drop empties.
    "words": lambda text: F.filter(
        F.split(F.lower(text), r"\s+"), lambda w: w != ""
    ),
    # Lines: split on newline (keep empties: line stats need them).
    "lines": lambda text: F.split(text, r"\n"),
    # Sentences: naive split on sentence-final punctuation.
    "sentences": lambda text: F.filter(
        F.split(text, r"[.!?]+"), lambda s: F.trim(s) != ""
    ),
}


def context_col(name: str) -> str:
    """Column name under which a materialized context is stored."""
    return f"_ctx_{name}"


class Op:
    """Base operator. Subclasses are registered via ``repro.core.register``.

    ``_name``/``_category``/``_tags`` are injected by the registry
    decorator; ``cost`` is a relative cost estimate used by the
    reordering optimizer (paper Sec. 7: run cheap selective filters
    first, delay expensive/fused ones).
    """

    _name: str = "op"
    _category: str = "op"
    _tags: tuple[str, ...] = ()
    #: Relative compute cost (1.0 = trivial expression); used for reordering.
    cost: float = 1.0

    @property
    def name(self) -> str:
        return self._name

    @property
    def category(self) -> str:
        return self._category

    @property
    def tags(self) -> tuple[str, ...]:
        return self._tags

    def __call__(self, df: DataFrame) -> DataFrame:
        return self.process(df)

    def process(self, df: DataFrame) -> DataFrame:  # pragma: no cover - abstract
        raise NotImplementedError

    def __repr__(self) -> str:  # e.g. Filter<word_count_filter>
        return f"{self._category.capitalize()}<{self._name}>"


class Formatter(Op):
    """Unifies an external data source into the unified representation."""

    _category = "formatter"

    def load_dataset(self, spark: SparkSession, path: str) -> DataFrame:
        raise NotImplementedError

    def process(self, df: DataFrame) -> DataFrame:
        # Formatters normally start from a path; processing an existing
        # DataFrame simply re-unifies it.
        return schema.ensure_schema(df)


class Mapper(Op):
    """In-place text editing at the single-sample level.

    Subclasses implement :meth:`transform_expr` (a Catalyst expression)
    when possible; Python-intrinsic mappers override :meth:`process`
    directly (kept rare — expressions keep the pipeline whole-stage
    codegen friendly).
    """

    _category = "mapper"

    def transform_expr(self, text: Column) -> Column:
        raise NotImplementedError

    def process(self, df: DataFrame) -> DataFrame:
        return df.withColumn(schema.TEXT_COL, self.transform_expr(F.col(schema.TEXT_COL)))


class Filter(Op):
    """Conditional sample removal, with decoupled stats computation.

    Mirrors the paper's ``compute_stats`` / ``process`` split
    (Appendix A.1): ``stats_exprs`` yields named Column expressions over
    the text (given shared contexts), ``predicate`` consumes the stats
    map. ``compute_stats`` = merge stats exprs into ``stats``;
    ``process`` = compute then filter.
    """

    _category = "filter"
    #: Context names this filter's stats need (for fusion grouping).
    context_keys: tuple[str, ...] = ()
    #: Estimated selectivity in [0,1] (fraction kept); reordering runs
    #: low-selectivity (high-discard) cheap filters first.
    selectivity: float = 0.9

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        raise NotImplementedError

    def predicate_for(self, exprs: Mapping[str, Column]) -> Column:
        """The keep-condition over the given stat expressions.

        Predicating on the raw expressions (not ``stats[key]`` map
        lookups) matters for plan cost: in a chained lazy plan, Catalyst
        pushes each predicate through the stats projection, and a
        ``GetMapValue(map_concat(map_filter(...)))`` chain rebuilds the
        whole merged stats map per access — quadratic in the number of
        chained Filters. Direct expressions keep the plan linear.
        """
        raise NotImplementedError

    def predicate(self) -> Column:
        """Keep-condition over an already-computed ``stats`` column
        (the Analyzer / interactive view of the same condition)."""
        return self.predicate_for({})

    # -- paper-interface methods -------------------------------------------
    def compute_stats(self, df: DataFrame) -> DataFrame:
        text = F.col(schema.TEXT_COL)
        ctx = {k: CONTEXT_BUILDERS[k](text) for k in self.context_keys}
        return schema.with_stats(df, self.stats_exprs(text, ctx))

    def process(self, df: DataFrame) -> DataFrame:
        text = F.col(schema.TEXT_COL)
        ctx = {k: CONTEXT_BUILDERS[k](text) for k in self.context_keys}
        exprs = self.stats_exprs(text, ctx)
        out = schema.with_stats(df, exprs)
        return out.filter(self.predicate_for(exprs) if exprs else self.predicate())


class Deduplicator(Op):
    """Dataset-level duplicate removal (hash- or vector-based).

    ``compute_hash`` adds fingerprint column(s); ``process`` removes
    duplicates keeping one representative per duplicate cluster.
    """

    _category = "deduplicator"
    cost = 5.0

    def compute_hash(self, df: DataFrame) -> DataFrame:
        raise NotImplementedError

    def process(self, df: DataFrame) -> DataFrame:
        raise NotImplementedError
