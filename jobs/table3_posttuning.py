"""Table 3 — pairwise judging of post-tuning data recipes.

Reproduces the two pairings of Table 3 with the GPT-4-judge substitute:

* LLaMA-7B (Alpaca) vs LLaMA-7B (Data-Juicer SFT,EN)   — paper 54/43 vs hidden
* LLaMA-7B (Random SFT,EN) vs (Data-Juicer SFT,EN)     — paper 60/46 vs 74/40

"Models" are retrieval responders tuned on each candidate 52k-scale
(×1e-2 → 520-example) SFT set; the DJ set is the SFT_REFINE recipe plus
diversity sampling over the 4-subset pool (alpaca, gpteacher, fastchat,
gpt4all), exactly the paper's (SFT, EN) construction.
"""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from pyspark.sql import functions as F  # noqa: E402

from repro.core import sampler  # noqa: E402
from repro.core.pipeline import run_recipe  # noqa: E402
from repro.corpus.posttuning import eval_instructions, sft_dataset, sft_union  # noqa: E402
from repro.judge.gpt4sim import judge_pair  # noqa: E402
from repro.judge.responder import RetrievalResponder  # noqa: E402
from repro.recipes import SFT_REFINE  # noqa: E402

N_EXAMPLES = 520  # 52k tokens-scale examples
N_EVAL = 174


def run(spark, out=print):
    pool = sft_union(spark).cache()
    refined, _ = run_recipe(pool, SFT_REFINE)
    refined = refined.cache()
    out(f"candidate pool: {pool.count()} examples; refined: {refined.count()}")
    dj = sampler.diversity_sample(refined, N_EXAMPLES, seed=0).cache()
    rnd = pool.orderBy(F.xxhash64("text", F.lit(123))).limit(N_EXAMPLES).cache()
    alpaca = sft_dataset(spark, "alpaca", seed=900).cache()

    evals = eval_instructions(N_EVAL)
    r_dj = RetrievalResponder(dj).respond(spark, evals).cache()
    r_alpaca = RetrievalResponder(alpaca).respond(spark, evals).cache()
    r_rnd = RetrievalResponder(rnd).respond(spark, evals).cache()

    t1 = judge_pair(r_alpaca, r_dj)
    t2 = judge_pair(r_rnd, r_dj)
    out("")
    out("Table 3 — pairwise model comparison (GPT-4-sim judge)")
    out(f"{'Training Data':<28} {'#Examples':>9} {'Win':>5} {'Tie':>5}   (paper Win/Tie)")
    out(f"{'Alpaca':<28} {N_EXAMPLES:>9} {t1.wins_a:>5} {t1.ties:>5}   (54/43)")
    out(f"{'Data-Juicer (SFT, EN)':<28} {N_EXAMPLES:>9} {t1.wins_b:>5} {t1.ties:>5}   (—/43)")
    out(f"{'Random (SFT, EN)':<28} {N_EXAMPLES:>9} {t2.wins_a:>5} {t2.ties:>5}   (60/46)")
    out(f"{'Data-Juicer (SFT, EN)':<28} {N_EXAMPLES:>9} {t2.wins_b:>5} {t2.ties:>5}   (74/40)")
    out("")
    out(f"DJ win-rate delta vs Alpaca: {100*(t1.win_rate('b')-t1.win_rate('a')):+.1f}% "
        "(paper: +16.25% avg)")
    out(f"DJ win-rate delta vs Random: {100*(t2.win_rate('b')-t2.win_rate('a')):+.1f}% "
        "(paper: +7.5%)")
    return t1, t2


def main() -> None:
    tee = Tee("table3_posttuning")
    spark = get_spark("table3")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
