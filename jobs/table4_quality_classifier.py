"""Tables 4 & 6 — quality-classifier fidelity.

Trains the three PySpark (Tokenizer|HashingTF|LogReg) classifiers on
4:1 train/eval splits of their synthetic corpora (Table 6 config) and
reports precision / recall / F1 against the paper's Table 4.
``--show-config`` prints the Table 6 training-configuration rows.
"""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from repro.corpus.quality_data import (  # noqa: E402
    chinese_training_data,
    code_training_data,
    gpt3_training_data,
)
from repro.quality.classifier import (  # noqa: E402
    TRAINING_CONFIGS,
    QualityClassifier,
    evaluate_classifier,
    train_eval_split,
)

PAPER_T4 = {
    "gpt3": (96.82, 98.14, 97.47),
    "chinese": (98.00, 99.30, 98.64),
    "code": (71.23, 54.21, 61.56),
}

_DATA = {
    "gpt3": gpt3_training_data,
    "chinese": chinese_training_data,
    "code": code_training_data,
}


def run(spark, out=print) -> dict[str, tuple[float, float, float]]:
    out("Table 4 — quality-classifier evaluation (paper P/R/F1 in parens)")
    out(f"{'Classifier':<10} {'Precision':>18} {'Recall':>18} {'F1':>18}")
    results = {}
    for name, gen in _DATA.items():
        pos, neg = gen(spark)
        pos_tr, pos_ev = train_eval_split(pos)
        neg_tr, neg_ev = train_eval_split(neg)
        clf = QualityClassifier(tokenizer=TRAINING_CONFIGS[name]["tokenizer"])
        clf.fit(pos_tr, neg_tr)
        m = evaluate_classifier(clf, pos_ev, neg_ev)
        p, r, f1 = PAPER_T4[name]
        out(f"{name:<10} {m.precision*100:>7.2f}% ({p:>6.2f}%) "
            f"{m.recall*100:>7.2f}% ({r:>6.2f}%) {m.f1*100:>7.2f}% ({f1:>6.2f}%)")
        results[name] = (m.precision, m.recall, m.f1)
    return results


def show_config(out=print) -> None:
    out("Table 6 — classifier training configuration")
    out(f"{'Classifier':<10} {'Tokenizer':<14} {'Keep':<8} {'Positive':<42} Negative")
    for name, cfg in TRAINING_CONFIGS.items():
        out(f"{name:<10} {cfg['tokenizer']:<14} {cfg['keep_method']:<8} "
            f"{cfg['positive']:<42} {cfg['negative']}")


def main() -> None:
    tee = Tee("table4_quality_classifier")
    if "--show-config" in sys.argv:
        show_config(tee)
        tee.close()
        return
    spark = get_spark("table4")
    show_config(tee)
    tee("")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
