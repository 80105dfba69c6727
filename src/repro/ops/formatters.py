"""Formatter OPs — data-format unification (paper Sec. 4.1, Table 1).

Each formatter loads an external source (txt / jsonl / csv / parquet /
code trees) into the unified ``(text, meta, stats)`` representation.
Unification is lazy: formatters only assemble Catalyst expressions over
Spark's readers (paper Sec. 7, "Optimized Data Unification").
"""
from __future__ import annotations

import os

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.base import Formatter
from repro.core.registry import register


@register("text_formatter")
class TextFormatter(Formatter):
    """Load plain-text files: one document per file (``wholetext``) or
    one document per line."""

    def __init__(self, wholetext: bool = True):
        self.wholetext = bool(wholetext)

    def load_dataset(self, spark: SparkSession, path: str) -> DataFrame:
        df = spark.read.text(path, wholetext=self.wholetext)
        df = df.withColumn("source_file", F.input_file_name())
        return schema.ensure_schema(df.withColumnRenamed("value", "text"))


@register("jsonl_formatter")
class JsonlFormatter(Formatter):
    """Load JSON-lines; the ``text_key`` column becomes ``text``, all
    other top-level scalar fields fold into ``meta``."""

    def __init__(self, text_key: str = "text"):
        self.text_key = text_key

    def load_dataset(self, spark: SparkSession, path: str) -> DataFrame:
        return schema.ensure_schema(spark.read.json(path), text_key=self.text_key)


@register("csv_formatter")
class CsvFormatter(Formatter):
    """Load CSV with header; ``text_key`` column becomes ``text``."""

    def __init__(self, text_key: str = "text"):
        self.text_key = text_key

    def load_dataset(self, spark: SparkSession, path: str) -> DataFrame:
        df = spark.read.option("header", True).csv(path)
        return schema.ensure_schema(df, text_key=self.text_key)


@register("parquet_formatter")
class ParquetFormatter(Formatter):
    """Load parquet; ``text_key`` column becomes ``text``."""

    def __init__(self, text_key: str = "text"):
        self.text_key = text_key

    def load_dataset(self, spark: SparkSession, path: str) -> DataFrame:
        return schema.ensure_schema(spark.read.parquet(path), text_key=self.text_key)


@register("code_formatter", tags=("code",))
class CodeFormatter(Formatter):
    """Load source-code trees (.py/.cpp/.java/...), one document per
    file, tagging ``meta['language']`` from the file extension."""

    _EXT_LANG = {
        ".py": "python", ".cpp": "cpp", ".cc": "cpp", ".c": "c", ".h": "c",
        ".java": "java", ".js": "javascript", ".go": "go", ".rs": "rust",
        ".sh": "shell", ".rb": "ruby",
    }

    def load_dataset(self, spark: SparkSession, path: str) -> DataFrame:
        df = spark.read.text(path, wholetext=True)
        fname = F.input_file_name()
        ext = F.lower(F.regexp_extract(fname, r"(\.[A-Za-z]+)$", 1))
        lang_map = F.create_map(
            *[x for k, v in self._EXT_LANG.items() for x in (F.lit(k), F.lit(v))]
        )
        df = (
            df.withColumnRenamed("value", "text")
            .withColumn("source_file", fname)
            .withColumn("language", F.coalesce(lang_map[ext], F.lit("unknown")))
        )
        return schema.ensure_schema(df)


@register("unify_formatter")
class UnifyFormatter(Formatter):
    """DataFrame → DataFrame re-unification: pick ``text_key`` as the
    text field (supports the paper's dot-delimited nested references via
    ``meta.*``) and fold the rest into ``meta``."""

    def __init__(self, text_key: str = "text"):
        self.text_key = text_key

    def load_dataset(self, spark: SparkSession, path: str) -> DataFrame:
        raise TypeError("unify_formatter re-unifies in-memory DataFrames; use process()")

    def process(self, df: DataFrame) -> DataFrame:
        if self.text_key.startswith("meta."):
            key = self.text_key[len("meta."):]
            df = df.withColumn("text", F.col(schema.META_COL)[key])
            return schema.ensure_schema(df)
        return schema.ensure_schema(df, text_key=self.text_key)


def write_jsonl(df: DataFrame, path: str) -> None:
    """Exporter counterpart: persist a unified dataset as JSON-lines."""
    os.makedirs(os.path.dirname(path) or ".", exist_ok=True)
    df.select(
        F.col(schema.TEXT_COL),
        F.col(schema.META_COL),
        F.col(schema.STATS_COL),
    ).write.mode("overwrite").json(path)
