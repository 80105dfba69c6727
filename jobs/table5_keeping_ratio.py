"""Table 5 — keeping ratios when re-sampling CommonCrawl.

Scores a CommonCrawl-like sample with the trained GPT-3 classifier and
reports the fraction kept under both keep methods: ``label``
(score > 0.5) and ``pareto`` (score > 1 − Pareto(α=9)). The paper's
comparison: original GPT-3 1.30% @pareto; reproduced GPT-3 3.22% @label
/ 1.41% @pareto — i.e. low single digits, with pareto < label.
"""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from repro.corpus.quality_data import commoncrawl_for_scoring, gpt3_training_data  # noqa: E402
from repro.quality.classifier import (  # noqa: E402
    QualityClassifier,
    keep_label,
    keep_pareto,
)


def run(spark, n_docs: int = 4000, out=print) -> tuple[float, float]:
    pos, neg = gpt3_training_data(spark)
    clf = QualityClassifier().fit(pos, neg)
    cc = commoncrawl_for_scoring(spark, n_docs)
    scored = clf.score(cc).cache()
    total = scored.count()
    ratio_label = keep_label(scored).count() / total
    ratio_pareto = keep_pareto(scored, alpha=9.0, seed=0).count() / total
    out("Table 5 — keeping ratio on (synthetic) CommonCrawl")
    out(f"{'Quality Classifier':<22} {'@label':>8} {'@pareto':>8}")
    out(f"{'Original GPT-3 (paper)':<22} {'—':>8} {'1.30%':>8}")
    out(f"{'GPT-3 (paper repro)':<22} {'3.22%':>8} {'1.41%':>8}")
    out(f"{'GPT-3 (ours)':<22} {ratio_label*100:>7.2f}% {ratio_pareto*100:>7.2f}%")
    return ratio_label, ratio_pareto


def main() -> None:
    tee = Tee("table5_keeping_ratio")
    spark = get_spark("table5")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
