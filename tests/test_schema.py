"""Unified data representation (paper Sec. 4.1)."""
import pytest
from pyspark.sql import functions as F

from repro.core import schema
from repro.oracle import assert_equivalent


def test_from_texts_columns(clean_df):
    assert clean_df.columns == ["text", "meta", "stats"]


def test_from_texts_count(spark):
    df = schema.from_texts(spark, ["a", "b", "c"])
    assert df.count() == 3


def test_empty_dataset(spark):
    df = schema.empty_dataset(spark)
    assert df.count() == 0
    assert df.columns == ["text", "meta", "stats"]


def test_meta_preserved(clean_df):
    row = clean_df.select("meta").first()[0]
    assert row["language"] == "EN"


def test_ensure_schema_folds_scalars(spark):
    df = spark.createDataFrame([("hello", "2023", 5)], ["text", "date", "n"])
    uni = schema.ensure_schema(df)
    row = uni.first()
    assert row["text"] == "hello"
    assert row["meta"]["date"] == "2023"
    assert row["meta"]["n"] == "5"
    assert row["stats"] == {}


def test_ensure_schema_custom_text_key(spark):
    df = spark.createDataFrame([("x", "body")], ["id", "content"])
    uni = schema.ensure_schema(df, text_key="content")
    assert uni.first()["text"] == "body"
    assert uni.first()["meta"]["id"] == "x"


def test_ensure_schema_missing_key(spark):
    df = spark.createDataFrame([("x",)], ["id"])
    with pytest.raises(ValueError, match="not found"):
        schema.ensure_schema(df)


def test_ensure_schema_merges_existing_meta(spark):
    df = schema.from_texts(spark, ["t"], metas=[{"a": "1"}])
    df = df.withColumn("extra", F.lit("v"))
    uni = schema.ensure_schema(df)
    meta = uni.first()["meta"]
    assert meta["a"] == "1" and meta["extra"] == "v"


@pytest.mark.parametrize("field,expect", [
    ("text", "hello world"),
    ("meta.language", "EN"),
])
def test_field_col(spark, field, expect):
    df = schema.from_texts(spark, ["hello world"], metas=[{"language": "EN"}])
    assert df.select(schema.field_col(field)).first()[0] == expect


def test_field_col_stats(spark):
    df = schema.from_texts(spark, ["x"])
    df = schema.with_stats(df, {"n": F.lit(7.0)})
    assert df.select(schema.field_col("stats.n")).first()[0] == 7.0


def test_field_col_invalid():
    with pytest.raises(ValueError):
        schema.field_col("bogus.key")


def test_with_stats_adds_key(spark):
    df = schema.from_texts(spark, ["abc"])
    out = schema.with_stats(df, {"char_count": F.length("text")})
    assert out.first()["stats"]["char_count"] == 3.0


def test_with_stats_overwrites(spark):
    df = schema.from_texts(spark, ["abc"])
    df = schema.with_stats(df, {"x": F.lit(1.0)})
    df = schema.with_stats(df, {"x": F.lit(2.0)})
    assert df.first()["stats"]["x"] == 2.0


def test_with_stats_keeps_other_keys(spark):
    df = schema.from_texts(spark, ["abc"])
    df = schema.with_stats(df, {"x": F.lit(1.0)})
    df = schema.with_stats(df, {"y": F.lit(3.0)})
    st = df.first()["stats"]
    assert st == {"x": 1.0, "y": 3.0}


def test_with_stats_empty_noop(spark):
    df = schema.from_texts(spark, ["abc"])
    assert schema.with_stats(df, {}) is df


def test_sample_ids_stable_and_distinct(spark):
    df = schema.from_texts(spark, ["a", "b", "a"])
    ids = [r[0] for r in schema.sample_ids(df).select("_dj_id").collect()]
    assert ids[0] == ids[2] and ids[0] != ids[1]


def test_char_count_matches_duckdb(spark, clean_df):
    out = clean_df.select(
        F.col("text").alias("t"), F.length("text").cast("long").alias("n")
    )
    assert_equivalent(out, "SELECT text AS t, length(text)::BIGINT AS n FROM d",
                      d=clean_df.select("text"))


def test_texts_of_roundtrip(spark):
    texts = ["alpha", "beta"]
    df = schema.from_texts(spark, texts)
    assert sorted(schema.texts_of(df)) == texts
