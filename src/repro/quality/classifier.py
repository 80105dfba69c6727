"""GPT-3-style text quality classifier (paper Sec. 6.2, Appendix B.1).

Faithful to the original construction — which the paper itself builds in
PySpark: a standard Tokenizer (or a Sentencepiece-style tokenizer for
Chinese/code), HashingTF features, and a binary logistic regression
scoring document quality. Two keep methods (App. B.1):

* ``label``  — keep iff doc_score > 0.5,
* ``pareto`` — keep iff doc_score > 1 − Pareto(α=9) sample (GPT-3 [10]).

``TRAINING_CONFIGS`` mirrors Table 6 (tokenizer, keep method, positive /
negative sources) with our synthetic corpus substitutes.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.ml import Pipeline as MLPipeline
from pyspark.ml import PipelineModel
from pyspark.ml.classification import LogisticRegression
from pyspark.ml.feature import HashingTF, RegexTokenizer
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import schema

#: Table 6, with paper datasets → synthetic component substitutes.
TRAINING_CONFIGS: dict[str, dict] = {
    "gpt3": {
        "tokenizer": "standard",
        "keep_method": "pareto",
        "positive": "wikipedia + books + openwebtext2 (synthetic)",
        "negative": "commoncrawl (synthetic)",
    },
    "chinese": {
        "tokenizer": "sentencepiece",
        "keep_method": "label",
        "positive": "wikipedia-zh + wudao (synthetic)",
        "negative": "zh samples from commoncrawl (synthetic)",
    },
    "code": {
        "tokenizer": "sentencepiece",
        "keep_method": "label",
        "positive": "thestack max_stars_count>=1372 (synthetic)",
        "negative": "random rest of thestack (synthetic)",
    },
}

#: Tokenizer-kind → RegexTokenizer pattern. "standard" is PySpark's
#: whitespace Tokenizer; "sentencepiece" is approximated by a
#: character/word hybrid (CJK chars become single tokens) — same
#: feature-extraction role as the Sentencepiece model in the paper.
_TOKEN_PATTERNS = {
    "standard": r"\s+",
    "sentencepiece": r"(?=[一-鿿])|\s+|(?<=[一-鿿])",
}


class QualityClassifier:
    """Tokenizer | HashingTF | LogisticRegression quality scorer."""

    def __init__(self, tokenizer: str = "standard", num_features: int = 1 << 16,
                 max_iter: int = 50, reg_param: float = 0.02):
        if tokenizer not in _TOKEN_PATTERNS:
            raise ValueError(f"unknown tokenizer {tokenizer!r}")
        self.tokenizer = tokenizer
        self.pipeline = MLPipeline(
            stages=[
                RegexTokenizer(
                    inputCol=schema.TEXT_COL, outputCol="_qc_tokens",
                    pattern=_TOKEN_PATTERNS[tokenizer], gaps=True, toLowercase=True,
                ),
                HashingTF(inputCol="_qc_tokens", outputCol="_qc_features",
                          numFeatures=num_features),
                LogisticRegression(
                    featuresCol="_qc_features", labelCol="label",
                    maxIter=max_iter, regParam=reg_param,
                ),
            ]
        )
        self.model: PipelineModel | None = None

    def fit(self, positive: DataFrame, negative: DataFrame) -> "QualityClassifier":
        """Train on positive (label 1) vs negative (label 0) corpora."""
        train = positive.withColumn("label", F.lit(1.0)).unionByName(
            negative.withColumn("label", F.lit(0.0))
        )
        self.model = self.pipeline.fit(train)
        return self

    def score(self, df: DataFrame) -> DataFrame:
        """Attach ``stats['quality_score']`` = P(label=1 | text)."""
        if self.model is None:
            raise RuntimeError("fit() the classifier first")
        from pyspark.ml.functions import vector_to_array

        scored = self.model.transform(df)
        p1 = F.element_at(vector_to_array(F.col("probability")), 2)
        out = schema.with_stats(scored, {"quality_score": p1})
        return out.drop("_qc_tokens", "_qc_features", "rawPrediction",
                        "probability", "prediction")


def keep_label(df: DataFrame, threshold: float = 0.5) -> DataFrame:
    """Keep method "label": doc_score > threshold."""
    return df.filter(schema.stat("quality_score") > threshold)


def keep_pareto(df: DataFrame, alpha: float = 9.0, seed: int = 0) -> DataFrame:
    """Keep method "pareto" [GPT-3]: doc_score > 1 − Pareto(α).

    The Pareto draw is per-row and seeded: u = rand(seed) →
    pareto = (1−u)^(−1/α) − 1 (inverse-CDF of numpy's Lomax/pareto).
    """
    u = F.rand(seed)
    pareto = F.pow(1.0 - u, F.lit(-1.0 / alpha)) - 1.0
    return df.filter(schema.stat("quality_score") > (1.0 - pareto))


@dataclass
class ClassifierMetrics:
    precision: float
    recall: float
    f1: float
    accuracy: float


def evaluate_classifier(clf: QualityClassifier, positive: DataFrame,
                        negative: DataFrame) -> ClassifierMetrics:
    """Precision/recall/F1 on a labelled eval split (Table 4 metrics)."""
    test = positive.withColumn("label", F.lit(1.0)).unionByName(
        negative.withColumn("label", F.lit(0.0))
    )
    scored = clf.score(test)
    pred = (schema.stat("quality_score") > 0.5).cast("double")
    counts = scored.agg(
        F.sum(((pred == 1.0) & (F.col("label") == 1.0)).cast("long")).alias("tp"),
        F.sum(((pred == 1.0) & (F.col("label") == 0.0)).cast("long")).alias("fp"),
        F.sum(((pred == 0.0) & (F.col("label") == 1.0)).cast("long")).alias("fn"),
        F.sum(((pred == 0.0) & (F.col("label") == 0.0)).cast("long")).alias("tn"),
    ).collect()[0]
    tp, fp, fn, tn = (counts[k] or 0 for k in ("tp", "fp", "fn", "tn"))
    precision = tp / (tp + fp) if tp + fp else 0.0
    recall = tp / (tp + fn) if tp + fn else 0.0
    f1 = 2 * precision * recall / (precision + recall) if precision + recall else 0.0
    accuracy = (tp + tn) / max(tp + fp + fn + tn, 1)
    return ClassifierMetrics(precision, recall, f1, accuracy)


def train_eval_split(df: DataFrame, ratio: float = 0.8, seed: int = 0) -> tuple[DataFrame, DataFrame]:
    """Deterministic 4:1 train/eval split (App. B.1)."""
    hashed = df.withColumn("_split", F.abs(F.xxhash64(schema.TEXT_COL, F.lit(seed))) % 1000)
    train = hashed.filter(F.col("_split") < int(ratio * 1000)).drop("_split")
    test = hashed.filter(F.col("_split") >= int(ratio * 1000)).drop("_split")
    return train, test
