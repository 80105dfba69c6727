"""Table 2 — pre-training recipe quality, benchmark-scale regeneration.

Runs a reduced-scale (5e-7) version of the Table 2 experiment and
asserts the paper's ordering: the Data-Juicer-refined merge beats the
RedPajama-only baseline at equal token budget. (The full-scale job —
``python jobs/table2_pretrain.py`` — reproduces all five rows.)
"""
import pytest

from repro.core.pipeline import run_recipe
from repro.corpus import components as C
from repro.llm import helm, trainer
from repro.recipes import PRETRAIN_REFINE

SCALE = 5e-7
BUDGET = int(150e9 * SCALE)


@pytest.mark.benchmark(group="table2")
def test_table2_refine_train_eval(benchmark, spark):
    def run():
        rp = C.redpajama(spark, SCALE).cache()
        union = rp.unionByName(C.pile(spark, SCALE))
        refined, _ = run_recipe(union, PRETRAIN_REFINE)
        refined = refined.cache()
        evalset = helm.full_eval_set(spark).cache()
        m_rp = trainer.pretrain(rp, BUDGET, seed=1)
        m_dj = trainer.pretrain(refined, BUDGET, seed=1)
        s_rp = helm.average_score(helm.evaluate(spark, m_rp, eval_df=evalset))
        s_dj = helm.average_score(helm.evaluate(spark, m_dj, eval_df=evalset))
        return s_rp, s_dj

    s_rp, s_dj = benchmark.pedantic(run, rounds=1, iterations=1)
    # Paper Fig. 7 / Table 2 shape: refined recipe > raw RedPajama.
    assert s_dj > s_rp
