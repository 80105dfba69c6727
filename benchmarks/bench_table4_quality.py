"""Tables 4 & 5 — quality-classifier training/eval + keeping ratios,
benchmark-scale regeneration. Asserts the Table 4 shape (text
classifiers high-F1, code classifier markedly worse) and the Table 5
shape (pareto keeps ≤ label; both far below half)."""
import pytest

from repro.corpus.quality_data import (
    code_training_data,
    commoncrawl_for_scoring,
    gpt3_training_data,
)
from repro.quality.classifier import (
    QualityClassifier,
    evaluate_classifier,
    keep_label,
    keep_pareto,
    train_eval_split,
)

N = 600


@pytest.mark.benchmark(group="table4")
def test_gpt3_vs_code_classifier(benchmark, spark):
    def run():
        pos, neg = gpt3_training_data(spark, n_per_class=N)
        ptr, pev = train_eval_split(pos)
        ntr, nev = train_eval_split(neg)
        m_gpt3 = evaluate_classifier(QualityClassifier().fit(ptr, ntr), pev, nev)
        cpos, cneg = code_training_data(spark, n_per_class=N)
        cptr, cpev = train_eval_split(cpos)
        cntr, cnev = train_eval_split(cneg)
        m_code = evaluate_classifier(
            QualityClassifier(tokenizer="sentencepiece").fit(cptr, cntr), cpev, cnev
        )
        return m_gpt3, m_code

    m_gpt3, m_code = benchmark.pedantic(run, rounds=1, iterations=1)
    assert m_gpt3.f1 > 0.85            # paper: 97.47%
    assert m_code.f1 < m_gpt3.f1       # paper: 61.56% — the weak one


@pytest.mark.benchmark(group="table5")
def test_keeping_ratios(benchmark, spark):
    def run():
        pos, neg = gpt3_training_data(spark, n_per_class=N)
        clf = QualityClassifier().fit(pos, neg)
        scored = clf.score(commoncrawl_for_scoring(spark, 1500)).cache()
        total = scored.count()
        return keep_label(scored).count() / total, keep_pareto(scored, seed=0).count() / total

    r_label, r_pareto = benchmark.pedantic(run, rounds=1, iterations=1)
    assert r_pareto <= r_label < 0.3  # paper: 3.22% / 1.41%
