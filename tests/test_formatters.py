"""Formatter OPs — format unification."""
import json
import os

import pytest

from repro.core import schema
from repro.core.registry import get_op
from repro.ops.formatters import write_jsonl


def test_text_formatter_wholetext(tmp_path, spark):
    (tmp_path / "a.txt").write_text("doc one\nwith lines")
    (tmp_path / "b.txt").write_text("doc two")
    df = get_op("text_formatter").load_dataset(spark, str(tmp_path))
    assert df.count() == 2
    assert df.columns == ["text", "meta", "stats"]
    assert any("doc one\nwith lines" == t for t in schema.texts_of(df))


def test_text_formatter_per_line(tmp_path, spark):
    (tmp_path / "a.txt").write_text("l1\nl2\nl3")
    df = get_op("text_formatter", wholetext=False).load_dataset(spark, str(tmp_path))
    assert df.count() == 3


def test_text_formatter_meta_source_file(tmp_path, spark):
    (tmp_path / "a.txt").write_text("x")
    df = get_op("text_formatter").load_dataset(spark, str(tmp_path))
    assert "a.txt" in df.first()["meta"]["source_file"]


def test_jsonl_formatter(tmp_path, spark):
    p = tmp_path / "d.jsonl"
    p.write_text("\n".join(json.dumps({"content": f"t{i}", "lang": "en"}) for i in range(3)))
    df = get_op("jsonl_formatter", text_key="content").load_dataset(spark, str(p))
    assert df.count() == 3
    assert df.first()["meta"]["lang"] == "en"


def test_csv_formatter(tmp_path, spark):
    p = tmp_path / "d.csv"
    p.write_text("text,src\nhello,a\nworld,b\n")
    df = get_op("csv_formatter").load_dataset(spark, str(p))
    assert sorted(schema.texts_of(df)) == ["hello", "world"]


def test_parquet_formatter(tmp_path, spark, clean_df):
    p = str(tmp_path / "d.parquet")
    clean_df.select("text").write.parquet(p)
    df = get_op("parquet_formatter").load_dataset(spark, p)
    assert sorted(schema.texts_of(df)) == sorted(schema.texts_of(clean_df))


def test_code_formatter_language_meta(tmp_path, spark):
    (tmp_path / "m.py").write_text("def f():\n    return 1\n")
    (tmp_path / "n.cpp").write_text("int main() { return 0; }\n")
    df = get_op("code_formatter").load_dataset(spark, str(tmp_path))
    langs = {r["meta"]["language"] for r in df.collect()}
    assert langs == {"python", "cpp"}


def test_unify_formatter_text_key(spark):
    df = spark.createDataFrame([("id1", "the body")], ["id", "body"])
    out = get_op("unify_formatter", text_key="body").process(df)
    assert out.first()["text"] == "the body"
    assert out.first()["meta"]["id"] == "id1"


def test_unify_formatter_meta_reference(spark):
    df = schema.from_texts(spark, ["outer"], metas=[{"instruction": "inner"}])
    out = get_op("unify_formatter", text_key="meta.instruction").process(df)
    assert out.first()["text"] == "inner"


def test_unify_formatter_rejects_path(spark):
    with pytest.raises(TypeError):
        get_op("unify_formatter").load_dataset(spark, "/nope")


def test_write_jsonl_roundtrip(tmp_path, spark, clean_df):
    p = str(tmp_path / "out")
    write_jsonl(clean_df, p)
    back = get_op("jsonl_formatter").load_dataset(spark, p)
    assert sorted(schema.texts_of(back)) == sorted(schema.texts_of(clean_df))
    assert os.path.isdir(p)
