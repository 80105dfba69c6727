"""Table 7 — statistics of the pre-training data recipe.

Generates the 15 components at ``scale`` of the paper's token counts,
counts tokens with the sentencepiece-lite tokenizer, and reports
sampling proportions with the Table 7 epoch boosts (Books ×2,
Wikipedia ×2.5), diffing against the paper's proportions.
"""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from repro.corpus import components as C  # noqa: E402
from repro.corpus.tokenizer import count_tokens  # noqa: E402


def run(spark, scale: float = 1e-6, out=print) -> dict[str, tuple[int, float]]:
    counts = {}
    for name in C.COMPONENTS:
        df = C.component(spark, name, scale)
        counts[name] = count_tokens(df)
    weighted = {
        name: n * C.EPOCHS.get(name, 1.0) for name, n in counts.items()
    }
    total = sum(weighted.values())
    out("Table 7 — pre-training data recipe statistics "
        f"(scale={scale:g}; proportions use Books x2 / Wikipedia x2.5 epochs)")
    out(f"{'Component':<18} {'#Tokens(paper)':>16} {'#Tokens(ours)':>14} "
        f"{'prop(paper)':>12} {'prop(ours)':>11}")
    result = {}
    for name in C.COMPONENTS:
        prop = 100.0 * weighted[name] / total
        out(f"{name:<18} {C.PAPER_TOKENS[name]:>16,} {counts[name]:>14,} "
            f"{C.PAPER_PROPORTIONS[name]:>11.2f}% {prop:>10.2f}%")
        result[name] = (counts[name], prop)
    return result


def main() -> None:
    tee = Tee("table7_pretrain_recipe")
    spark = get_spark("table7")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
