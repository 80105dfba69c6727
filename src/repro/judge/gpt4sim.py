"""Deterministic pairwise judge — GPT-4-scoring substitute (Table 3).

Scores a response on the axes a GPT-4 rubric prompt asks about:
relevance to the instruction, adequate length, lexical diversity, and
absence of noise/boilerplate/flagged content. The judge is a pure
Column expression; pairwise comparison tallies wins and ties exactly
like the paper's table. The *shape* of the outcome (which training data
wins) is produced entirely by the data each responder was tuned on.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.corpus.text_gen import BOILERPLATE_LINES
from repro.ops._resources import FLAGGED_WORDS


def _words(col: Column) -> Column:
    return F.filter(F.split(F.lower(col), r"\W+"), lambda w: w != "")


def response_quality(instruction: Column, response: Column) -> Column:
    """Heuristic quality score in ~[0, 1]."""
    iw = F.array_distinct(_words(instruction))
    rw = _words(response)
    rw_set = F.array_distinct(rw)
    n = F.size(rw)
    # Relevance: fraction of instruction content words echoed in response.
    overlap = F.size(F.array_intersect(iw, rw_set))
    relevance = F.when(F.size(iw) > 0, overlap / F.size(iw)).otherwise(F.lit(0.0))
    # Length adequacy: 1 inside [20, 120] words, linear falloff outside.
    length = (
        F.when(n < 20, n / F.lit(20.0))
        .when(n > 120, F.greatest(F.lit(0.0), 1 - (n - 120) / F.lit(200.0)))
        .otherwise(F.lit(1.0))
    )
    diversity = F.when(n > 0, F.size(rw_set) / n).otherwise(F.lit(0.0))
    # Noise penalties: flagged words, boilerplate, gibberish chars.
    fw = F.array([F.lit(w) for w in FLAGGED_WORDS])
    flagged = F.size(F.filter(rw, lambda w: F.array_contains(fw, w))) > 0
    lowered = F.lower(response)
    boiler = F.lit(False)
    for b in BOILERPLATE_LINES:
        boiler = boiler | lowered.contains(b)
    gibberish = (
        F.length(F.regexp_replace(response, r"[0-9A-Za-z\s.,;:!?'\"()-]", ""))
        / F.greatest(F.length(response), F.lit(1))
    ) > 0.02
    penalty = (
        flagged.cast("double") * 0.4
        + boiler.cast("double") * 0.3
        + gibberish.cast("double") * 0.3
    )
    return (
        0.35 * relevance + 0.35 * length + 0.30 * diversity - penalty
    )


@dataclass
class PairwiseTally:
    """Wins/ties over an eval set (Table 3 row pair)."""

    wins_a: int
    wins_b: int
    ties: int

    @property
    def total(self) -> int:
        return self.wins_a + self.wins_b + self.ties

    def win_rate(self, side: str = "a") -> float:
        return (self.wins_a if side == "a" else self.wins_b) / max(self.total, 1)


def judge_pair(resp_a: DataFrame, resp_b: DataFrame, tie_margin: float = 0.02) -> PairwiseTally:
    """Pairwise-compare two responders' outputs on the same eval set.

    Inputs are (eval_id, instruction, response) frames from
    :class:`repro.judge.responder.RetrievalResponder.respond`.
    """
    a = resp_a.select(
        "eval_id", F.col("instruction"),
        F.col("response").alias("_ra"),
    )
    b = resp_b.select("eval_id", F.col("response").alias("_rb"))
    joined = (
        a.join(b, on="eval_id")
        .withColumn("score_a", response_quality(F.col("instruction"), F.col("_ra")))
        .withColumn("score_b", response_quality(F.col("instruction"), F.col("_rb")))
    )
    verdict = (
        F.when(F.col("score_a") - F.col("score_b") > tie_margin, "a")
        .when(F.col("score_b") - F.col("score_a") > tie_margin, "b")
        .otherwise("tie")
    )
    counts = {r["v"]: r["n"] for r in
              joined.select(verdict.alias("v")).groupBy("v").agg(F.count("*").alias("n")).collect()}
    return PairwiseTally(
        wins_a=counts.get("a", 0), wins_b=counts.get("b", 0), ties=counts.get("tie", 0)
    )
