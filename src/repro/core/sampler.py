"""Enhanced samplers for LLM data (paper Sec. 6.2).

Stratified sampling over metadata / statistics fields with heterogeneous
criteria (document length, token count, boolean predicates, linguistic
diversity via lead verb–noun pairs) — the utilities behind the
"Data-Juicer (SFT, EN)" subset of Table 3 that beats random sampling.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F

from repro.core import schema


def stratified_sample(
    df: DataFrame,
    strata: Column | str,
    n_total: int,
    allocation: str = "proportional",
    seed: int = 0,
) -> DataFrame:
    """Sample ``n_total`` rows stratified by ``strata``.

    ``allocation='proportional'`` keeps strata shares; ``'equal'`` gives
    each stratum an equal quota (diversity-boosting). Rows within a
    stratum are ranked by a seeded hash → deterministic.
    """
    if allocation not in ("proportional", "equal"):
        raise ValueError("allocation must be 'proportional' or 'equal'")
    strata_col = schema.field_col(strata) if isinstance(strata, str) else strata
    tagged = df.withColumn("_stratum", strata_col.cast("string"))
    counts = {r["_stratum"]: r["n"] for r in
              tagged.groupBy("_stratum").agg(F.count("*").alias("n")).collect()}
    total = sum(counts.values())
    if total == 0:
        return df.limit(0)
    k = len(counts)
    quotas: dict[str, int] = {}
    if allocation == "proportional":
        for s, n in counts.items():
            quotas[s] = min(n, max(1, round(n_total * n / total)))
    else:
        per = max(1, n_total // max(k, 1))
        for s, n in counts.items():
            quotas[s] = min(n, per)
    quota_map = F.create_map(
        *[x for s, q in quotas.items() for x in (F.lit(s), F.lit(q))]
    )
    w = Window.partitionBy("_stratum").orderBy(
        F.xxhash64(F.col(schema.TEXT_COL), F.lit(seed))
    )
    return (
        tagged.withColumn("_rank", F.row_number().over(w))
        .filter(F.col("_rank") <= quota_map[F.col("_stratum")])
        .drop("_stratum", "_rank")
    )


def predicate_sample(df: DataFrame, predicate: Column, n_total: int, seed: int = 0) -> DataFrame:
    """Boolean-predicate criterion: sample only rows satisfying it."""
    return stratified_sample(df.filter(predicate), F.lit("all"), n_total, seed=seed)


def length_stratified_sample(df: DataFrame, n_total: int, buckets: int = 4, seed: int = 0) -> DataFrame:
    """Stratify by document-length quartile (the document-length criterion)."""
    qs = df.select(F.length(schema.TEXT_COL).alias("_len")).approxQuantile(
        "_len", [i / buckets for i in range(1, buckets)], 0.01
    )
    edges = sorted(set(qs))
    bucket = F.lit(0)
    for i, e in enumerate(edges, start=1):
        bucket = F.when(F.length(schema.TEXT_COL) > e, i).otherwise(bucket)
    return stratified_sample(df, bucket, n_total, allocation="equal", seed=seed)


def lead_verb_noun(df: DataFrame) -> DataFrame:
    """Attach ``meta['verb']``/``meta['noun']`` ≈ the paper's root-verb /
    direct-object diversity probe: first word and first later noun-ish
    word (length>3) of the text — a POS-tagger-free proxy."""
    words = F.filter(F.split(F.lower(F.col(schema.TEXT_COL)), r"\W+"), lambda w: w != "")
    verb = F.element_at(words, 1)
    noun = F.element_at(
        F.filter(F.slice(words, 2, 50), lambda w: F.length(w) > 3), 1
    )
    return df.withColumn(
        schema.META_COL,
        F.map_concat(
            F.col(schema.META_COL),
            F.create_map(
                F.lit("verb"), F.coalesce(verb, F.lit("")),
                F.lit("noun"), F.coalesce(noun, F.lit("")),
            ),
        ),
    )


def diversity_sample(df: DataFrame, n_total: int, seed: int = 0) -> DataFrame:
    """Linguistic-diversity criterion: equal quota per lead verb–noun
    pair, so no single instruction pattern dominates the sample."""
    tagged = lead_verb_noun(df)
    pair = F.concat_ws("|", schema.meta("verb"), schema.meta("noun"))
    return stratified_sample(tagged, pair, n_total, allocation="equal", seed=seed)
