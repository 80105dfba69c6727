"""Tables 2 & 9 — pre-training data quality via the proxy-LLM benchmark.

Five models, mirroring the paper's rows at scale 1e-6 (1B → 1k tokens):

| paper row                         | here                                     |
|-----------------------------------|------------------------------------------|
| Falcon-1.3B (RefinedWeb, 350B)    | proxy on filtered-web only, 350k tokens  |
| Pythia-1.4B (Pile, 300B)          | proxy on raw Pile-flavour, 300k tokens   |
| LLaMA-1.3B (DJ RedPajama+Pile,150B)| proxy on DJ-refined merge, 150k tokens  |
| + Alpaca-CoT-IFT (150B+15B)       | + raw IFT merge, +15k tokens             |
| + Our Refined IFT (150B+4.7B)     | + IFT_REFINE output (~30-55% volume)     |

``--per-task`` additionally prints the Table 9 per-task matrix.
"""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from repro.core.pipeline import run_recipe  # noqa: E402
from repro.corpus import components as C  # noqa: E402
from repro.corpus.posttuning import ift_corpus  # noqa: E402
from repro.corpus.tokenizer import count_tokens  # noqa: E402
from repro.llm import helm, trainer  # noqa: E402
from repro.recipes import IFT_REFINE, PRETRAIN_REFINE  # noqa: E402

PAPER_ROWS = {
    "Falcon-1.3B (RefinedWeb, 350B)": 33.97,
    "Pythia-1.4B (Pile, 300B)": 33.96,
    "LLaMA-1.3B Data-Juicer (RedPajama+Pile, 150B)": 34.21,
    "  + Alpaca-CoT-IFT (150B+15B)": 35.04,
    "  + Our Refined IFT (150B+4.7B)": 36.76,
}


def run(spark, scale: float = 1e-6, per_task: bool = False, out=print):
    budget = int(150e9 * scale)
    rp = C.redpajama(spark, scale).cache()
    pile = C.pile(spark, scale).cache()
    union = rp.unionByName(pile)
    refined, _ = run_recipe(union, PRETRAIN_REFINE)
    refined = refined.cache()
    out(f"refined merge: {refined.count()} docs, {count_tokens(refined)} tokens")
    ift_raw = ift_corpus(spark, int(15e9 * scale)).cache()
    ift_ref, _ = run_recipe(ift_raw, IFT_REFINE)
    ift_ref = ift_ref.cache()
    out(f"IFT raw {count_tokens(ift_raw)} tokens -> refined {count_tokens(ift_ref)} tokens")

    models = {
        "Falcon-1.3B (RefinedWeb, 350B)":
            trainer.pretrain(C.refinedweb(spark, scale), int(350e9 * scale), seed=1),
        "Pythia-1.4B (Pile, 300B)":
            trainer.pretrain(pile, int(300e9 * scale), seed=1),
        "LLaMA-1.3B Data-Juicer (RedPajama+Pile, 150B)":
            trainer.pretrain(refined, budget, seed=1),
        "  + Alpaca-CoT-IFT (150B+15B)":
            trainer.continue_with(refined, budget, ift_raw, int(15e9 * scale), seed=1),
        "  + Our Refined IFT (150B+4.7B)":
            trainer.continue_with(refined, budget, ift_ref, None, seed=1),
    }
    evalset = helm.full_eval_set(spark).cache()
    evalset.count()
    all_scores = {}
    out("")
    out("Table 2 — average score on the 16 HELM-like core tasks")
    out(f"{'Model / Training Data':<48} {'paper':>6} {'ours':>6}")
    for name, model in models.items():
        scores = helm.evaluate(spark, model, eval_df=evalset)
        all_scores[name] = scores
        out(f"{name:<48} {PAPER_ROWS[name]:>6.2f} {helm.average_score(scores):>6.2f}")
    if per_task:
        out("")
        out("Table 9 — per-task scores")
        out(helm.leaderboard(all_scores).to_string())
    return all_scores


def main() -> None:
    tee = Tee("table2_pretrain")
    spark = get_spark("table2")
    run(spark, per_task="--per-task" in sys.argv, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
