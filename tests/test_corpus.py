"""Synthetic corpora substrate — determinism, pathologies, Table 7/8 data."""
import pytest
from pyspark.sql import functions as F

from repro.core import schema
from repro.corpus import components as C
from repro.corpus.posttuning import (
    SFT_SUBSETS,
    build_registry,
    eval_instructions,
    ift_corpus,
    registry_df,
    sft_dataset,
    sft_union,
)
from repro.corpus.text_gen import Profile, clean_eval_texts, make_document
from repro.corpus.tokenizer import count_tokens, tokenize_expr

import numpy as np

TINY = 2e-8  # ~2k tokens per component floor


def test_make_document_deterministic():
    a = make_document(np.random.default_rng(5), Profile("wiki"))
    b = make_document(np.random.default_rng(5), Profile("wiki"))
    assert a == b


def test_component_deterministic(spark):
    a = schema.texts_of(C.component(spark, "wikipedia", TINY))
    b = schema.texts_of(C.component(spark, "wikipedia", TINY))
    assert a == b


def test_fifteen_components():
    assert len(C.COMPONENTS) == 15
    assert set(C.COMPONENTS) == set(C.PAPER_TOKENS) == set(C.PAPER_PROPORTIONS)


def test_component_token_floor(spark):
    df = C.component(spark, "nih_exporter", TINY)
    assert count_tokens(df) >= 2000


def test_component_meta_tags(spark):
    row = C.component(spark, "arxiv", TINY).first()
    assert row["meta"]["component"] == "arxiv"
    assert row["meta"]["language"] == "EN"


def test_commoncrawl_noisier_than_wikipedia(spark):
    from repro.core.registry import get_op

    op = get_op("special_char_ratio_filter")
    cc = op.compute_stats(C.component(spark, "commoncrawl", TINY))
    wiki = op.compute_stats(C.component(spark, "wikipedia", TINY))
    mean = lambda df: df.agg(F.mean(schema.stat("special_char_ratio"))).collect()[0][0]
    assert mean(cc) > mean(wiki)


def test_commoncrawl_contains_duplicates(spark):
    df = C.component(spark, "commoncrawl", 1e-7)
    n = df.count()
    assert df.select("text").distinct().count() < n


def test_arxiv_contains_latex(spark):
    texts = schema.texts_of(C.component(spark, "arxiv", TINY))
    assert any("\\documentclass" in t for t in texts)


def test_redpajama_has_seven_components(spark):
    df = C.redpajama(spark, TINY)
    comps = {r[0] for r in df.select(schema.meta("component")).distinct().collect()}
    assert len(comps) == 7 and "commoncrawl" in comps


def test_pile_differs_from_redpajama_docs(spark):
    rp = set(schema.texts_of(C.component(spark, "wikipedia", TINY)))
    pile_wiki = C.pile(spark, TINY).filter(schema.meta("component") == "wikipedia")
    assert not rp & set(schema.texts_of(pile_wiki))  # seed-offset draws


def test_union_doubles_overlap(spark):
    union = C.union_redpajama_pile(spark, TINY)
    rp = C.redpajama(spark, TINY)
    pile = C.pile(spark, TINY)
    assert union.count() == rp.count() + pile.count()


def test_refinedweb_single_domain(spark):
    df = C.refinedweb(spark, TINY)
    domains = {r[0] for r in df.select(schema.meta("domain")).distinct().collect()}
    assert domains == {"web"}


def test_clean_eval_texts_are_clean(spark):
    from repro.core.registry import get_op

    texts = clean_eval_texts("wiki", 10, seed=1)
    df = schema.from_texts(spark, texts)
    op = get_op("flagged_words_filter", max_val=0.0)
    assert op(df).count() == 10


def test_tokenizer_splits_punct(spark):
    df = spark.createDataFrame([("Hello, world!",)], ["text"])
    toks = df.select(tokenize_expr(F.col("text")).alias("t")).first()["t"]
    assert toks == ["hello", ",", "world", "!"]


def test_tokenizer_cjk_chars(spark):
    df = spark.createDataFrame([("中文ab",)], ["text"])
    toks = df.select(tokenize_expr(F.col("text")).alias("t")).first()["t"]
    assert toks == ["中", "文", "ab"]


def test_count_tokens_additive(spark, clean_df):
    half = clean_df.limit(2)
    assert count_tokens(clean_df) > count_tokens(half) > 0


# -- post-tuning collection --------------------------------------------------

def test_registry_has_45_datasets():
    assert len(build_registry()) == 45


def test_registry_table8_language_counts(spark):
    reg = registry_df(spark)
    counts = {r[0]: r[1] for r in reg.groupBy("language").count().collect()}
    assert counts == {"English": 28, "Chinese": 14, "Multilingual": 3}


def test_registry_table8_usage_counts(spark):
    reg = registry_df(spark)
    counts = {r[0]: r[1] for r in reg.select(F.explode("usage").alias("u"))
              .groupBy("u").count().collect()}
    assert counts == {"Instruction Fine-Tuning": 17, "Supervised Fine-Tuning": 23,
                      "Preference": 5, "Multi-Round Dialog": 2}


def test_registry_table8_task_counts(spark):
    reg = registry_df(spark)
    counts = {r[0]: r[1] for r in reg.filter(F.col("task_type").isNotNull())
              .groupBy("task_type").count().collect()}
    assert counts == {"Multi-Task": 27, "Task-Specific": 13}


def test_registry_table8_gen_counts(spark):
    reg = registry_df(spark)
    counts = {r[0]: r[1] for r in reg.filter(F.col("gen_method").isNotNull())
              .groupBy("gen_method").count().collect()}
    assert counts == {"Human-Generated": 3, "Self-Instruct": 12, "Mixed": 5,
                      "Collection of Datasets": 19}


def test_sft_dataset_sizes(spark):
    for name, prof in SFT_SUBSETS.items():
        df = sft_dataset(spark, name, seed=1)
        assert df.count() == prof.n_examples, name


def test_sft_dataset_meta_fields(spark):
    row = sft_dataset(spark, "alpaca", seed=1).first()
    assert row["meta"]["usage"] == "SFT" and row["meta"]["language"] == "EN"
    assert row["meta"]["instruction"] and row["meta"]["response"]
    assert "### Instruction:" in row["text"]


def test_gpt4all_noisier_than_gpteacher(spark):
    from repro.core.registry import get_op

    op = get_op("special_char_ratio_filter")
    mean = lambda df: op.compute_stats(df).agg(
        F.mean(schema.stat("special_char_ratio"))).collect()[0][0]
    assert mean(sft_dataset(spark, "gpt4all", 1)) > mean(sft_dataset(spark, "gpteacher", 1))


def test_sft_union_size(spark):
    assert sft_union(spark).count() == sum(p.n_examples for p in SFT_SUBSETS.values())


def test_eval_instructions_deterministic():
    assert eval_instructions(10, seed=1) == eval_instructions(10, seed=1)
    assert len(eval_instructions(174)) == 174


def test_ift_corpus_reaches_budget(spark):
    df = ift_corpus(spark, 3000)
    assert count_tokens(df) >= 3000


def test_ift_corpus_refined_flag_cleaner(spark):
    from repro.core.registry import get_op

    raw = ift_corpus(spark, 3000, seed=5)
    ref = ift_corpus(spark, 3000, seed=5, refined_quality=True)
    op = get_op("flagged_words_filter", max_val=0.0)
    assert op(ref).count() / ref.count() > op(raw).count() / raw.count()
