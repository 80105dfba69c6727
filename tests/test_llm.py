"""Proxy-LLM substrate: bigram LM, HELM-like benchmark, trainer."""
import math

import pytest
from pyspark.sql import functions as F

from repro.core import schema
from repro.llm import helm, trainer
from repro.llm.bigram import (
    perplexity,
    perplexity_by_group,
    sample_to_token_budget,
    score_from_ppl,
    train,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny_model(spark, clean_df):
    return train(clean_df)


def test_unigram_counts_match_duckdb(spark):
    df = schema.from_texts(spark, ["a b a", "b c"])
    model = train(df)
    got = model.unigrams.filter(F.col("token") != "<s>").select("token", F.col("u_cnt").cast("long").alias("n"))
    sql = ("SELECT tok AS token, count(*)::BIGINT AS n FROM "
           "(SELECT unnest(list_filter(string_split_regex(lower(text), '\\s+'), x -> x <> '')) AS tok FROM d) "
           "GROUP BY tok")
    assert_equivalent(got, sql, d=df.select("text"))


def test_bigram_counts_sum(spark):
    df = schema.from_texts(spark, ["a b c", "d e"])
    model = train(df)
    # one bigram per adjacent pair incl. BOS: (3-1+1)+(2-1+1) = 5... with BOS
    # arrays are [<s>,a,b,c] and [<s>,d,e] → 3+2 pairs.
    total = model.bigrams.agg(F.sum("b_cnt")).collect()[0][0]
    assert total == 5


def test_vocab_and_total(spark):
    df = schema.from_texts(spark, ["a b a"])
    model = train(df)
    assert model.vocab_size == 3  # <s>, a, b
    assert model.total_tokens == 4


def test_perplexity_lower_on_seen_text(spark, tiny_model, clean_df, noisy_df):
    assert perplexity(tiny_model, clean_df) < perplexity(tiny_model, noisy_df)


def test_perplexity_by_group_matches_single(spark, tiny_model, clean_df):
    tagged = clean_df.withColumn(
        "meta", F.create_map(F.lit("task"), F.lit("t1"))
    )
    grouped = perplexity_by_group(tiny_model, tagged, "task")
    single = perplexity(tiny_model, clean_df)
    assert grouped["t1"] == pytest.approx(single, rel=1e-9)


def test_perplexity_empty_eval(spark, tiny_model):
    df = schema.from_texts(spark, [""])
    assert perplexity(tiny_model, df) == float("inf")


def test_score_from_ppl_monotone():
    assert score_from_ppl(50) > score_from_ppl(500) > score_from_ppl(5000)
    assert score_from_ppl(float("inf")) == 0.0
    assert score_from_ppl(1.0) == 100.0


def test_sample_to_token_budget(spark):
    texts = [("w " * 50).strip()] * 20  # 50 tokens each
    df = schema.from_texts(spark, texts)
    out = sample_to_token_budget(df, 250, seed=0)
    assert out.count() == 5  # floor(250/50)


def test_sample_to_token_budget_deterministic(spark, mixed_df):
    a = sorted(schema.texts_of(sample_to_token_budget(mixed_df, 60, seed=3)))
    b = sorted(schema.texts_of(sample_to_token_budget(mixed_df, 60, seed=3)))
    assert a == b


def test_trainer_budget_respected(spark, clean_df):
    m_small = trainer.pretrain(clean_df, 30, seed=0)
    m_large = trainer.pretrain(clean_df, 10_000, seed=0)
    assert m_small.total_tokens < m_large.total_tokens


def test_continue_with_adds_counts(spark, clean_df, noisy_df):
    base = trainer.pretrain(clean_df, 10_000, seed=0)
    cont = trainer.continue_with(clean_df, 10_000, noisy_df, 10_000, seed=0)
    assert cont.total_tokens > base.total_tokens


def test_sixteen_tasks():
    assert len(helm.TASKS) == 16
    names = {t.name for t in helm.TASKS}
    assert "MMLU" in names and "RAFT" in names


def test_instruct_tasks_match_table9_gainers():
    instruct = {t.name for t in helm.TASKS if t.instruct}
    # NarrativeQA and CNN/DailyMail were the big IFT gainers in Table 9.
    assert "NarrativeQA" in instruct and "CNN/DailyMail" in instruct


def test_task_eval_set_tagged(spark):
    df = helm.task_eval_set(spark, helm.TASKS[0])
    assert df.first()["meta"]["task"] == helm.TASKS[0].name


def test_full_eval_set_covers_all_tasks(spark):
    df = helm.full_eval_set(spark)
    tasks = {r[0] for r in df.select(schema.meta("task")).distinct().collect()}
    assert tasks == {t.name for t in helm.TASKS}


def test_evaluate_returns_all_scores(spark, tiny_model):
    scores = helm.evaluate(spark, tiny_model)
    assert set(scores) == {t.name for t in helm.TASKS}
    assert all(0 <= v <= 100 for v in scores.values())


def test_average_score(spark):
    assert helm.average_score({"a": 10.0, "b": 20.0}) == 15.0


def test_leaderboard_layout():
    board = helm.leaderboard({"m1": {"t": 10.0}, "m2": {"t": 20.0}})
    assert list(board.columns) == ["m1", "m2"]
    assert board.loc["Average", "m2"] == 20.0


def test_clean_training_beats_noisy_training(spark, clean_df, noisy_df, mixed_df):
    """The core Table 2 mechanism in miniature: same eval, training on
    clean text yields lower perplexity than training on noisy text."""
    eval_df = clean_df
    m_clean = train(clean_df)
    m_noisy = train(noisy_df)
    assert perplexity(m_clean, eval_df) < perplexity(m_noisy, eval_df)
