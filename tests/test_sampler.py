"""Enhanced samplers (paper Sec. 6.2)."""
import pytest
from pyspark.sql import functions as F

from repro.core import sampler, schema


@pytest.fixture(scope="module")
def tagged_df(spark):
    texts = [f"doc number {i} with several words of content here" for i in range(60)]
    metas = [{"lang": "EN" if i % 3 else "ZH"} for i in range(60)]
    return schema.from_texts(spark, texts, metas).cache()


def test_proportional_total(tagged_df):
    out = sampler.stratified_sample(tagged_df, "meta.lang", 30)
    assert abs(out.count() - 30) <= 2


def test_proportional_shares(tagged_df):
    out = sampler.stratified_sample(tagged_df, "meta.lang", 30)
    counts = {r[0]: r[1] for r in
              out.groupBy(schema.meta("lang")).count().collect()}
    # EN:ZH is 2:1 in the population.
    assert counts["EN"] > counts["ZH"]


def test_equal_allocation(tagged_df):
    out = sampler.stratified_sample(tagged_df, "meta.lang", 20, allocation="equal")
    counts = {r[0]: r[1] for r in out.groupBy(schema.meta("lang")).count().collect()}
    assert counts["EN"] == counts["ZH"] == 10


def test_deterministic_in_seed(tagged_df):
    a = sorted(schema.texts_of(sampler.stratified_sample(tagged_df, "meta.lang", 10, seed=7)))
    b = sorted(schema.texts_of(sampler.stratified_sample(tagged_df, "meta.lang", 10, seed=7)))
    c = sorted(schema.texts_of(sampler.stratified_sample(tagged_df, "meta.lang", 10, seed=8)))
    assert a == b and a != c


def test_bad_allocation(tagged_df):
    with pytest.raises(ValueError):
        sampler.stratified_sample(tagged_df, "meta.lang", 5, allocation="nope")


def test_quota_capped_by_stratum_size(spark):
    df = schema.from_texts(spark, ["a", "b"], metas=[{"g": "x"}, {"g": "y"}])
    out = sampler.stratified_sample(df, "meta.g", 100)
    assert out.count() == 2


def test_empty_input(spark):
    df = schema.empty_dataset(spark)
    assert sampler.stratified_sample(df, F.lit("s"), 5).count() == 0


def test_predicate_sample(tagged_df):
    pred = schema.meta("lang") == "EN"
    out = sampler.predicate_sample(tagged_df, pred, 10)
    assert out.count() == 10
    assert all(r[0] == "EN" for r in out.select(schema.meta("lang")).collect())


def test_length_stratified(spark):
    texts = ["w " * n for n in (2, 4, 40, 80, 200, 400, 800, 1000)]
    df = schema.from_texts(spark, texts)
    out = sampler.length_stratified_sample(df, 4)
    lengths = sorted(len(t) for t in schema.texts_of(out))
    assert len(lengths) >= 3  # spans multiple length buckets


def test_lead_verb_noun_tags(spark):
    df = schema.from_texts(spark, ["Write a short story about dragons"])
    tagged = sampler.lead_verb_noun(df).first()["meta"]
    assert tagged["verb"] == "write"
    assert tagged["noun"] == "short"


def test_diversity_sample_spreads_verbs(spark):
    texts = (["Write about x y z"] * 20) + ["Explain topic alpha beta",
                                            "Summarize item gamma delta"]
    df = schema.from_texts(spark, texts)
    out = sampler.diversity_sample(df, 3, seed=0)
    verbs = {t.split()[0] for t in schema.texts_of(out)}
    assert verbs == {"Write", "Explain", "Summarize"}
