"""Analyzer — dataset statistics over 13 default dimensions (paper Sec. 5.2).

Reuses the decoupled ``stats_exprs`` of Filter OPs over the *whole*
dataset (the exact benefit the paper claims for the stats/process
split), fused into a single projection, then aggregates count / mean /
std / min / max / quantiles per dimension — the numbers behind the
histograms and box plots of Figure 4.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.base import Filter
from repro.core.fusion import FusedFilter
from repro.core.registry import get_op

#: The paper's "13 dimensions" default probe: perplexity, word count,
#: flagged-word percentage, paragraph length, and friends.
DEFAULT_DIMENSIONS: tuple[str, ...] = (
    "char_count_filter",
    "word_count_filter",
    "line_count_filter",
    "avg_word_length_filter",
    "avg_line_length_filter",
    "max_line_length_filter",
    "alnum_ratio_filter",
    "special_char_ratio_filter",
    "stopword_ratio_filter",
    "flagged_words_filter",
    "perplexity_filter",
    "paragraph_count_filter",
    "sentence_count_filter",
)

_QUANTILES = (0.25, 0.5, 0.75)


class Analyzer:
    """Computes per-sample stats and dataset-level summaries."""

    def __init__(self, dimensions: tuple[str, ...] = DEFAULT_DIMENSIONS):
        self.filters: list[Filter] = [get_op(name) for name in dimensions]

    @property
    def stat_keys(self) -> list[str]:
        return [f.stat_key for f in self.filters]  # type: ignore[attr-defined]

    def compute_stats(self, df: DataFrame) -> DataFrame:
        """Attach all probe dimensions to ``stats`` in one fused pass."""
        return FusedFilter(self.filters).compute_stats(df)

    def summary(self, df: DataFrame, computed: bool = False) -> pd.DataFrame:
        """Summary table: one row per dimension with count, mean, std,
        min, q25, median, q75, max. ``computed=True`` skips the stats
        pass when ``df`` already carries them."""
        stats_df = df if computed else self.compute_stats(df)
        aggs = []
        for key in self.stat_keys:
            col = schema.stat(key)
            aggs += [
                F.count(col).alias(f"{key}__count"),
                F.mean(col).alias(f"{key}__mean"),
                F.stddev_samp(col).alias(f"{key}__std"),
                F.min(col).alias(f"{key}__min"),
                *[
                    F.percentile_approx(col, q, 10_000).alias(f"{key}__q{int(q*100)}")
                    for q in _QUANTILES
                ],
                F.max(col).alias(f"{key}__max"),
            ]
        row = stats_df.agg(*aggs).collect()[0].asDict()
        records = []
        for key in self.stat_keys:
            records.append(
                {
                    "dimension": key,
                    "count": row[f"{key}__count"],
                    "mean": row[f"{key}__mean"],
                    "std": row[f"{key}__std"],
                    "min": row[f"{key}__min"],
                    "q25": row[f"{key}__q25"],
                    "median": row[f"{key}__q50"],
                    "q75": row[f"{key}__q75"],
                    "max": row[f"{key}__max"],
                }
            )
        return pd.DataFrame.from_records(records)
