"""Unified intermediate data representation (paper Sec. 4.1).

Every dataset flowing through Data-Juicer OPs is a Spark DataFrame with
three conceptual parts:

* ``text``  — the raw textual payload (``string``),
* ``meta``  — metadata key/values (``map<string,string>``), e.g. date,
  language tag, source component,
* ``stats`` — per-sample statistics produced and consumed by Filter OPs
  and the Analyzer (``map<string,double>``).

The paper backs this with Huggingface-datasets / Apache Arrow; here the
columnar substrate is Spark's own (Catalyst + Tungsten + Arrow for
pandas interchange), which provides the same column-oriented, lazily
evaluated foundation. Nested "dot-delimited" field access
(``text.instruction`` in the paper) maps to map keys in ``meta``
(``meta['instruction']``) — see :func:`field_col`.
"""
from __future__ import annotations

from typing import Iterable, Mapping, Sequence

from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

TEXT_COL = "text"
META_COL = "meta"
STATS_COL = "stats"

#: Canonical Spark schema of the unified representation.
DJ_SCHEMA = T.StructType(
    [
        T.StructField(TEXT_COL, T.StringType(), nullable=False),
        T.StructField(META_COL, T.MapType(T.StringType(), T.StringType()), nullable=True),
        T.StructField(STATS_COL, T.MapType(T.StringType(), T.DoubleType()), nullable=True),
    ]
)


def empty_dataset(spark: SparkSession) -> DataFrame:
    """An empty DataFrame in the unified representation."""
    return spark.createDataFrame([], DJ_SCHEMA)


def from_texts(
    spark: SparkSession,
    texts: Sequence[str],
    metas: Sequence[Mapping[str, str]] | None = None,
) -> DataFrame:
    """Build a unified dataset from in-memory texts (test/demo helper)."""
    metas = metas if metas is not None else [{} for _ in texts]
    rows = [(t, dict(m), {}) for t, m in zip(texts, metas)]
    return spark.createDataFrame(rows, DJ_SCHEMA)


def ensure_schema(df: DataFrame, text_key: str = TEXT_COL) -> DataFrame:
    """Coerce an arbitrary DataFrame into the unified representation.

    This is the "data unification" step of Formatter OPs: the column
    named ``text_key`` becomes ``text``; every other scalar column is
    folded into the ``meta`` map (stringified); a fresh empty ``stats``
    map is attached if absent. Unification is *lazy* (paper Sec. 7):
    nothing is materialized here, we only build Catalyst expressions.
    """
    cols = df.columns
    if text_key not in cols:
        raise ValueError(f"column {text_key!r} not found among {cols}")
    meta_entries: list[Column] = []
    for c in cols:
        if c in (text_key, STATS_COL, META_COL):
            continue
        meta_entries.append(F.lit(c))
        meta_entries.append(F.col(c).cast("string"))
    if META_COL in cols:
        extra = (
            F.map_concat(F.col(META_COL), F.create_map(*meta_entries))
            if meta_entries
            else F.col(META_COL)
        )
    else:
        extra = (
            F.create_map(*meta_entries)
            if meta_entries
            else F.create_map().cast("map<string,string>")
        )
    stats = (
        F.col(STATS_COL)
        if STATS_COL in cols
        else F.create_map().cast("map<string,double>")
    )
    return df.select(
        F.col(text_key).cast("string").alias(TEXT_COL),
        extra.alias(META_COL),
        stats.alias(STATS_COL),
    )


def field_col(field: str) -> Column:
    """Resolve a dot-delimited field reference to a Column.

    ``"text"`` → the text column; ``"meta.language"`` →
    ``meta['language']``; ``"stats.word_count"`` → ``stats['word_count']``.
    This reproduces the paper's nested-field access ("text.instruction")
    over the unified representation.
    """
    if field == TEXT_COL:
        return F.col(TEXT_COL)
    for prefix, col in ((f"{META_COL}.", META_COL), (f"{STATS_COL}.", STATS_COL)):
        if field.startswith(prefix):
            return F.col(col)[field[len(prefix):]]
    raise ValueError(
        f"unknown field {field!r}; expected 'text', 'meta.<k>' or 'stats.<k>'"
    )


def with_stats(df: DataFrame, exprs: Mapping[str, Column]) -> DataFrame:
    """Merge named stat expressions into the ``stats`` map column.

    New keys overwrite existing ones (``map_concat`` with duplicate-key
    last-wins requires ``spark.sql.mapKeyDedupPolicy=LAST_WIN``; instead
    we rebuild deterministically by filtering out overwritten keys).
    """
    if not exprs:
        return df
    names = list(exprs)
    new_map = F.create_map(
        *[x for name in names for x in (F.lit(name), exprs[name].cast("double"))]
    )
    keep_old = F.map_filter(
        F.coalesce(F.col(STATS_COL), F.create_map().cast("map<string,double>")),
        lambda k, _: ~k.isin(names),
    )
    return df.withColumn(STATS_COL, F.map_concat(keep_old, new_map))


def stat(name: str) -> Column:
    """Shorthand for reading a computed stat: ``stats['name']``."""
    return F.col(STATS_COL)[name]


def meta(name: str) -> Column:
    """Shorthand for reading a metadata field: ``meta['name']``."""
    return F.col(META_COL)[name]


def sample_ids(df: DataFrame) -> DataFrame:
    """Attach a stable per-row id column ``_dj_id`` for tracing.

    Uses a hash of (text, meta) — stable across recomputation, unlike
    ``monotonically_increasing_id``. Collisions across *distinct* rows
    are astronomically unlikely (sha256) and only affect trace samples.
    """
    return df.withColumn(
        "_dj_id",
        F.sha2(
            F.concat_ws(
                "\x00",
                F.col(TEXT_COL),
                F.to_json(F.col(META_COL)),
            ),
            256,
        ),
    )


def texts_of(df: DataFrame, limit: int | None = None) -> list[str]:
    """Collect the text column (test helper)."""
    rows: Iterable = (df.limit(limit) if limit else df).select(TEXT_COL).collect()
    return [r[0] for r in rows]
