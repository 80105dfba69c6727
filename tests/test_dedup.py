"""Deduplicator OPs — exact, MinHash, SimHash, vector."""
import pytest
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.registry import get_op
from repro.oracle import assert_equivalent

NEAR_A = ("The quick brown fox jumps over the lazy dog and then walks through "
          "the green field toward the old farm house by the river.")
NEAR_B = NEAR_A.replace("dog and", "dog, and").replace("river.", "river!")
OTHER = ("Completely different content about cooking recipes, delicious food "
         "preparation methods, baking bread and roasting seasonal vegetables.")


@pytest.fixture(scope="module")
def near_dup_df(spark):
    return schema.from_texts(spark, [NEAR_A, NEAR_B, OTHER, NEAR_A, "tiny"])


def test_exact_dedup_removes_exact_only(near_dup_df):
    out = get_op("document_dedup")(near_dup_df)
    assert out.count() == 4  # the two identical NEAR_A collapse


def test_exact_dedup_whitespace_case_insensitive(spark):
    df = schema.from_texts(spark, ["Hello  World", "hello world", "bye"])
    assert get_op("document_dedup")(df).count() == 2


def test_exact_dedup_oracle_count(spark, near_dup_df):
    out = get_op("document_dedup")(near_dup_df).select(F.col("text").alias("t"))
    sql = ("SELECT t FROM (SELECT text AS t, row_number() OVER "
           "(PARTITION BY regexp_replace(lower(trim(text)), '\\s+', ' ', 'g') "
           "ORDER BY text) rn FROM d) WHERE rn = 1")
    assert_equivalent(out, sql, d=near_dup_df.select("text"))


def test_exact_dedup_deterministic(near_dup_df):
    a = sorted(schema.texts_of(get_op("document_dedup")(near_dup_df)))
    b = sorted(schema.texts_of(get_op("document_dedup")(near_dup_df)))
    assert a == b


def test_minhash_removes_near_and_exact(near_dup_df):
    out = get_op("minhash_dedup")(near_dup_df)
    texts = schema.texts_of(out)
    # NEAR_A/NEAR_B/NEAR_A cluster to one survivor; OTHER and tiny remain.
    assert len(texts) == 3
    assert OTHER in texts and "tiny" in texts


def test_minhash_keeps_distinct(spark):
    df = schema.from_texts(spark, [NEAR_A, OTHER])
    assert get_op("minhash_dedup")(df).count() == 2


def test_minhash_bad_params():
    with pytest.raises(ValueError, match="divisible"):
        get_op("minhash_dedup", num_perm=10, bands=3)


def test_simhash_removes_exact(near_dup_df):
    out = get_op("simhash_dedup")(near_dup_df)
    assert out.count() <= 4  # at minimum the identical pair collapses


def test_simhash_near_dup_with_loose_threshold(spark):
    df = schema.from_texts(spark, [NEAR_A, NEAR_B, OTHER])
    out = get_op("simhash_dedup", max_hamming=16)(df)
    assert out.count() == 2
    assert OTHER in schema.texts_of(out)


def test_vector_dedup(near_dup_df):
    out = get_op("vector_dedup")(near_dup_df)
    texts = schema.texts_of(out)
    assert len(texts) == 3 and OTHER in texts


def test_vector_dedup_empty_doc_survives(spark):
    df = schema.from_texts(spark, ["", NEAR_A, NEAR_A])
    out = get_op("vector_dedup")(df)
    assert "" in schema.texts_of(out)


@pytest.mark.parametrize("name", ["document_dedup", "minhash_dedup",
                                  "simhash_dedup", "vector_dedup"])
def test_dedup_schema_clean(near_dup_df, name):
    out = get_op(name)(near_dup_df)
    assert out.columns == ["text", "meta", "stats"]


@pytest.mark.parametrize("name", ["document_dedup", "minhash_dedup",
                                  "simhash_dedup", "vector_dedup"])
def test_dedup_noop_on_unique(spark, clean_df, name):
    assert get_op(name)(clean_df).count() == clean_df.count()


def test_compute_hash_interface(near_dup_df):
    hashed = get_op("document_dedup").compute_hash(near_dup_df)
    assert "_dj_hash" in hashed.columns
    sigs = get_op("minhash_dedup", num_perm=16, bands=4).compute_hash(near_dup_df)
    assert "_dj_sig" in sigs.columns
    assert len(sigs.first()["_dj_sig"]) == 16


def test_union_find_clusters():
    from repro.ops.dedup import _union_find

    clusters = _union_find([("b", "a"), ("c", "b"), ("e", "d")])
    assert clusters["a"] == clusters["b"] == clusters["c"] == "a"
    assert clusters["d"] == clusters["e"] == "d"
