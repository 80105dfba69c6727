"""Bigram language model trained with Spark DataFrame aggregations.

The substitute for LLaMA pre-training (DESIGN.md): an add-k-smoothed
bigram LM whose downstream "benchmark scores" move with training-data
quality through the same mechanisms the paper relies on — noise tokens
dilute probability mass, duplicates skew it, and domain coverage
determines eval-set fit. Everything is DataFrame-native: token arrays →
``posexplode``-free bigram construction with ``arrays_zip(slice, slice)``
→ ``groupBy().count()``; perplexity is a join + aggregate.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import schema
from repro.corpus.tokenizer import tokenize_expr

_BOS = "<s>"


@dataclass
class BigramModel:
    """Counts tables + smoothing constants of a trained bigram LM."""

    unigrams: DataFrame       # (token, u_cnt)
    bigrams: DataFrame        # (prev, token, b_cnt)
    vocab_size: int
    total_tokens: int
    k: float = 0.05           # add-k smoothing


def _token_arrays(df: DataFrame) -> DataFrame:
    """(tokens array) per document, BOS-prefixed."""
    toks = tokenize_expr(F.col(schema.TEXT_COL))
    return df.select(
        F.concat(F.array(F.lit(_BOS)), toks).alias("tokens")
    ).filter(F.size("tokens") > 1)


def _bigram_pairs(tokens_df: DataFrame) -> DataFrame:
    """(prev, token) rows from token arrays, built as Catalyst
    expressions: zip(tokens[0:n-1], tokens[1:n])."""
    t = F.col("tokens")
    n = F.size(t)
    pairs = F.arrays_zip(
        F.slice(t, 1, n - 1).alias("prev"),
        F.slice(t, 2, n - 1).alias("token"),
    )
    return tokens_df.select(F.explode(pairs).alias("p")).select(
        F.col("p.prev").alias("prev"), F.col("p.token").alias("token")
    )


def train(df: DataFrame, k: float = 0.05) -> BigramModel:
    """Fit counts on a unified dataset (one Spark job per table)."""
    tokens_df = _token_arrays(df)
    unigrams = (
        tokens_df.select(F.explode("tokens").alias("token"))
        .groupBy("token").agg(F.count("*").alias("u_cnt"))
        .cache()
    )
    bigrams = (
        _bigram_pairs(tokens_df)
        .groupBy("prev", "token").agg(F.count("*").alias("b_cnt"))
        .cache()
    )
    stats = unigrams.agg(
        F.count("*").alias("v"), F.sum("u_cnt").alias("n")
    ).collect()[0]
    return BigramModel(
        unigrams=unigrams,
        bigrams=bigrams,
        vocab_size=int(stats["v"]),
        total_tokens=int(stats["n"]),
        k=k,
    )


def perplexity(model: BigramModel, eval_df: DataFrame) -> float:
    """Corpus-level perplexity of ``eval_df`` under ``model``.

    p(w|prev) = (c(prev,w) + k) / (c(prev) + k·(V+1)); unseen prev backs
    off to the same formula with c(prev)=0. V+1 accounts for an OOV slot.
    """
    pairs = _bigram_pairs(_token_arrays(eval_df))
    joined = (
        pairs.join(model.bigrams, on=["prev", "token"], how="left")
        .join(
            model.unigrams.withColumnRenamed("token", "prev")
            .withColumnRenamed("u_cnt", "prev_cnt"),
            on="prev", how="left",
        )
    )
    k, v = model.k, model.vocab_size + 1
    logp = F.log(
        (F.coalesce(F.col("b_cnt"), F.lit(0)) + F.lit(k))
        / (F.coalesce(F.col("prev_cnt"), F.lit(0)) + F.lit(k * v))
    )
    row = joined.agg(
        F.sum(logp).alias("ll"), F.count("*").alias("n")
    ).collect()[0]
    if not row["n"]:
        return float("inf")
    return math.exp(-float(row["ll"]) / int(row["n"]))


def perplexity_by_group(model: BigramModel, eval_df: DataFrame,
                        group_key: str = "task") -> dict[str, float]:
    """Per-group perplexities in ONE Spark job.

    ``eval_df`` is a unified dataset whose ``meta[group_key]`` names the
    group (e.g. the benchmark task). Evaluating all 16 HELM-like tasks
    through one join+groupBy instead of 16 separate jobs is a ~16×
    driver-roundtrip saving.
    """
    toks = tokenize_expr(F.col(schema.TEXT_COL))
    tokens_df = eval_df.select(
        schema.meta(group_key).alias("_grp"),
        F.concat(F.array(F.lit(_BOS)), toks).alias("tokens"),
    ).filter(F.size("tokens") > 1)
    t = F.col("tokens")
    n = F.size(t)
    zipped = F.arrays_zip(
        F.slice(t, 1, n - 1).alias("prev"), F.slice(t, 2, n - 1).alias("token")
    )
    pairs = tokens_df.select("_grp", F.explode(zipped).alias("p")).select(
        "_grp", F.col("p.prev").alias("prev"), F.col("p.token").alias("token")
    )
    joined = (
        pairs.join(model.bigrams, on=["prev", "token"], how="left")
        .join(
            model.unigrams.withColumnRenamed("token", "prev")
            .withColumnRenamed("u_cnt", "prev_cnt"),
            on="prev", how="left",
        )
    )
    k, v = model.k, model.vocab_size + 1
    logp = F.log(
        (F.coalesce(F.col("b_cnt"), F.lit(0)) + F.lit(k))
        / (F.coalesce(F.col("prev_cnt"), F.lit(0)) + F.lit(k * v))
    )
    rows = joined.groupBy("_grp").agg(
        F.sum(logp).alias("ll"), F.count("*").alias("n")
    ).collect()
    return {
        r["_grp"]: math.exp(-float(r["ll"]) / int(r["n"])) for r in rows if r["n"]
    }


def score_from_ppl(ppl: float) -> float:
    """Monotone ppl → 0-100 "benchmark score" map: 100 · ppl^(−1/4).

    Calibrated so the ppl range our proxies produce (~50–2000) lands in
    the 15–40 band the paper's Table 2/9 HELM scores occupy.
    """
    if not math.isfinite(ppl) or ppl <= 0:
        return 0.0
    return 100.0 * ppl ** (-0.25)


def sample_to_token_budget(df: DataFrame, budget_tokens: int, seed: int = 0) -> DataFrame:
    """Deterministically take documents (in seeded-hash order) until the
    cumulative whitespace-token count reaches ``budget_tokens`` — the
    "train for N tokens" knob of Table 2."""
    from pyspark.sql import Window

    n_toks = F.size(F.split(F.col(schema.TEXT_COL), r"\s+"))
    w = (
        Window.orderBy(F.xxhash64(schema.TEXT_COL, F.lit(seed)))
        .rowsBetween(Window.unboundedPreceding, Window.currentRow)
    )
    return (
        df.withColumn("_cum", F.sum(n_toks).over(w))
        .filter(F.col("_cum") <= budget_tokens)
        .drop("_cum")
    )
