"""OP fusion and reordering (paper Sec. 7, Figure 6).

The optimizer works on an OP list exactly as Figure 6 describes:

1. **Detect OP groups** — maximal runs of *consecutive Filters* (filters
   are commutative with each other: each only reads ``text`` and writes
   disjoint ``stats`` keys, so any order yields the same surviving set).
2. **Fuse** — within a group, filters that share computation contexts
   (``words`` / ``lines`` / ``sentences``) are amalgamated into one
   :class:`FusedFilter` that materializes every needed context once,
   evaluates all member stats in a single projection, and applies the
   conjunction of member predicates. Contexts are dropped immediately
   after the fused OP ("contexts cleaned up after each fused OP").
3. **Reorder** — within the group, cheap OPs run first and expensive
   (e.g. fused) OPs are delayed so they see fewer samples (commutativity
   makes this safe); ties broken by selectivity (drop-more first).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.base import CONTEXT_BUILDERS, Filter, Op, context_col


class FusedFilter(Filter):
    """A single OP amalgamating several context-sharing Filters."""

    _category = "filter"

    def __init__(self, members: list[Filter]):
        if not members:
            raise ValueError("FusedFilter needs at least one member")
        self.members = list(members)
        self._name = "fused(" + ",".join(m.name for m in members) + ")"
        self.context_keys = tuple(
            dict.fromkeys(k for m in members for k in m.context_keys)
        )
        self.cost = sum(m.cost for m in members)
        sel = 1.0
        for m in members:
            sel *= m.selectivity
        self.selectivity = sel

    def stats_exprs(self, text, ctx):
        out = {}
        for m in self.members:
            out.update(m.stats_exprs(text, ctx))
        return out

    def compute_stats(self, df: DataFrame) -> DataFrame:
        text = F.col(schema.TEXT_COL)
        # Materialize each shared context as a column so all member stats
        # reference one evaluation (the paper's context manager).
        for key in self.context_keys:
            df = df.withColumn(context_col(key), CONTEXT_BUILDERS[key](text))
        ctx = {k: F.col(context_col(k)) for k in self.context_keys}
        df = schema.with_stats(df, self.stats_exprs(text, ctx))
        # Context cleanup: "little extra memory is required".
        return df.drop(*[context_col(k) for k in self.context_keys])

    def predicate_for(self, exprs):
        pred = self.members[0].predicate_for(exprs)
        for m in self.members[1:]:
            pred = pred & m.predicate_for(exprs)
        return pred

    def process(self, df: DataFrame) -> DataFrame:
        text = F.col(schema.TEXT_COL)
        for key in self.context_keys:
            df = df.withColumn(context_col(key), CONTEXT_BUILDERS[key](text))
        ctx = {k: F.col(context_col(k)) for k in self.context_keys}
        exprs = self.stats_exprs(text, ctx)
        df = schema.with_stats(df, exprs).filter(self.predicate_for(exprs))
        return df.drop(*[context_col(k) for k in self.context_keys])


def detect_groups(ops: list[Op]) -> list[tuple[int, int]]:
    """(start, end) index spans of maximal consecutive-Filter runs."""
    spans, i = [], 0
    while i < len(ops):
        if isinstance(ops[i], Filter):
            j = i
            while j + 1 < len(ops) and isinstance(ops[j + 1], Filter):
                j += 1
            spans.append((i, j))
            i = j + 1
        else:
            i += 1
    return spans


def fuse_group(filters: list[Filter]) -> list[Filter]:
    """Fuse the context-using filters of a group into one FusedFilter.

    Filters without contexts stay standalone (nothing shared to reuse);
    a "fused" group of one is left as the original OP.
    """
    fusible = [f for f in filters if f.context_keys]
    standalone = [f for f in filters if not f.context_keys]
    if len(fusible) >= 2:
        return standalone + [FusedFilter(fusible)]
    return standalone + fusible


def reorder_group(filters: list[Filter]) -> list[Filter]:
    """Cheap OPs first, expensive (fused) last; drop-more first on ties."""
    return sorted(filters, key=lambda f: (f.cost, f.selectivity))


def optimize(ops: list[Op], fuse: bool = True, reorder: bool = True) -> list[Op]:
    """Apply fusion and reordering to an OP list (non-Filter OPs keep
    their absolute positions; only Filter runs are rewritten)."""
    out: list[Op] = []
    i = 0
    while i < len(ops):
        if isinstance(ops[i], Filter):
            j = i
            group: list[Filter] = []
            while j < len(ops) and isinstance(ops[j], Filter):
                group.append(ops[j])  # type: ignore[arg-type]
                j += 1
            if fuse:
                group = fuse_group(group)
            if reorder:
                group = reorder_group(group)
            out.extend(group)
            i = j
        else:
            out.append(ops[i])
            i += 1
    return out
