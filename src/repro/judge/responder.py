"""Retrieval-based "post-tuned model" (DESIGN.md substitution).

A model post-tuned on an SFT set surfaces that set's data quality in its
responses; a TF-IDF nearest-neighbour responder surfaces it *directly*:
given an eval instruction it returns the response of the most similar
training instruction. Implemented as DataFrame joins: explode
instruction tokens on both sides, weight matches by IDF, take the
argmax training example per eval prompt.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.core import schema


def _instr_tokens(col) -> "F.Column":
    return F.array_distinct(
        F.filter(F.split(F.lower(col), r"\W+"), lambda w: (w != "") & (F.length(w) > 2))
    )


class RetrievalResponder:
    """Fit on an SFT dataset (meta.instruction / meta.response)."""

    def __init__(self, train_df: DataFrame):
        self.train_df = train_df
        spark = train_df.sparkSession
        base = train_df.select(
            F.monotonically_increasing_id().alias("train_id"),
            schema.meta("instruction").alias("instruction"),
            schema.meta("response").alias("response"),
        ).cache()
        self.n_train = base.count()  # materialize → stable ids
        self.tokens = base.select(
            "train_id", F.explode(_instr_tokens(F.col("instruction"))).alias("tok")
        ).cache()
        # IDF over training instructions: log(N / df(tok)).
        self.idf = (
            self.tokens.groupBy("tok")
            .agg(F.countDistinct("train_id").alias("df"))
            .select("tok", F.log(F.lit(float(self.n_train)) / F.col("df")).alias("idf"))
            .cache()
        )
        self.base = base

    def respond(self, spark: SparkSession, instructions: list[str]) -> DataFrame:
        """(eval_id, instruction, response) — best-match response per
        prompt; ties broken by train_id for determinism; prompts with no
        token overlap fall back to the first training response."""
        eval_df = spark.createDataFrame(
            [(i, ins) for i, ins in enumerate(instructions)],
            "eval_id long, instruction string",
        )
        etoks = eval_df.select(
            "eval_id", F.explode(_instr_tokens(F.col("instruction"))).alias("tok")
        )
        scores = (
            etoks.join(self.idf, on="tok")
            .join(self.tokens, on="tok")
            .groupBy("eval_id", "train_id")
            .agg(F.sum("idf").alias("score"))
        )
        w = Window.partitionBy("eval_id").orderBy(
            F.desc("score"), F.asc("train_id")
        )
        best = (
            scores.withColumn("_rn", F.row_number().over(w))
            .filter(F.col("_rn") == 1)
            .select("eval_id", "train_id")
        )
        fallback = self.base.orderBy("train_id").limit(1).select(
            F.col("response").alias("_fb")
        )
        out = (
            eval_df.join(best, on="eval_id", how="left")
            .join(self.base.select("train_id", "response"), on="train_id", how="left")
            .crossJoin(fallback)
            .select(
                "eval_id",
                "instruction",
                F.coalesce("response", "_fb").alias("response"),
            )
        )
        return out
