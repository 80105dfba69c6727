"""Tracer — per-OP sample-change tracking (paper Sec. 5.2).

Records, for each applied OP, a bounded sample of what changed:

* Mappers       — (before, after) text pairs that differ,
* Filters       — discarded samples,
* Deduplicators — removed (near-)duplicate samples.

Joins are on the stable content id of :func:`repro.core.schema.sample_ids`.
The records power the interactive-visualization feedback loop; here they
are plain Python structures a caller can render or assert on.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import schema


@dataclass
class TraceRecord:
    """What one OP did to the dataset."""

    op_name: str
    kind: str  # "mapper" | "filter" | "deduplicator" | "formatter"
    n_before: int
    n_after: int
    #: bounded sample of changes: for mappers (before, after) texts;
    #: for filters/dedup, the dropped texts.
    samples: list = field(default_factory=list)

    @property
    def n_dropped(self) -> int:
        return self.n_before - self.n_after


class Tracer:
    """Collects :class:`TraceRecord` per OP, bounded to ``sample_limit``."""

    def __init__(self, sample_limit: int = 10):
        self.sample_limit = int(sample_limit)
        self.records: list[TraceRecord] = []

    def trace(self, op, before: DataFrame, after: DataFrame) -> TraceRecord:
        kind = op.category
        n_before, n_after = before.count(), after.count()
        if kind == "mapper":
            samples = self._changed_pairs(before, after)
        elif kind in ("filter", "deduplicator"):
            samples = self._dropped(before, after)
        else:
            samples = []
        rec = TraceRecord(op.name, kind, n_before, n_after, samples)
        self.records.append(rec)
        return rec

    def _changed_pairs(self, before: DataFrame, after: DataFrame) -> list[tuple[str, str]]:
        b = schema.sample_ids(before).select(
            "_dj_id", F.col(schema.TEXT_COL).alias("_before")
        )
        # Mappers preserve row order and meta; re-id after edit would
        # change the hash, so join positionally via meta+id of *before*
        # is impossible — instead zip by an order-stable key: meta json +
        # original row. Practical approach: mappers keep `meta`
        # untouched, so pair rows on (meta, position-in-group); for
        # tracing purposes a meta-equality join with text inequality
        # sampled is sufficient.
        a = after.select(
            F.to_json(F.col(schema.META_COL)).alias("_mj"),
            F.col(schema.TEXT_COL).alias("_after"),
        )
        bb = before.select(
            F.to_json(F.col(schema.META_COL)).alias("_mj"),
            F.col(schema.TEXT_COL).alias("_before"),
        )
        pairs = (
            bb.join(a, on="_mj")
            .filter(F.col("_before") != F.col("_after"))
            .limit(self.sample_limit)
            .collect()
        )
        return [(r["_before"], r["_after"]) for r in pairs]

    def _dropped(self, before: DataFrame, after: DataFrame) -> list[str]:
        b = schema.sample_ids(before)
        a = schema.sample_ids(after).select("_dj_id").distinct()
        dropped = (
            b.join(a, on="_dj_id", how="left_anti")
            .select(schema.TEXT_COL)
            .limit(self.sample_limit)
            .collect()
        )
        return [r[0] for r in dropped]

    def summary(self) -> list[dict]:
        """One row per OP: name, kind, rows before/after/dropped."""
        return [
            {
                "op": r.op_name,
                "kind": r.kind,
                "before": r.n_before,
                "after": r.n_after,
                "dropped": r.n_dropped,
            }
            for r in self.records
        ]
