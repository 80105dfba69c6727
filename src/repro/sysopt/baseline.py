"""RedPajama-style baseline pipeline (paper Sec. 8.2.1 comparator).

The paper's §8.2.1 baseline is the official RedPajama repo: independent
single-purpose Python scripts, one full pass *and one materialization of
the whole dataset per processing step*, with per-row Python functions.
This module reproduces that execution model faithfully over Spark so the
comparison is apples-to-apples on the same engine:

* every OP runs as a **plain Python UDF** (row-at-a-time, no Catalyst
  expressions, no Arrow batching),
* after every OP the full dataset is **written to and re-read from
  disk** (the intermediate-jsonl habit of the baseline scripts),
* no fusion, no reordering, no context sharing.

The Data-Juicer side of the benchmark runs the *same logical OPs* via
``repro.core.pipeline`` in fused/lazy mode.
"""
from __future__ import annotations

import math
import os
import re
import shutil
import time
from dataclasses import dataclass, field
from typing import Callable

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core import schema
from repro.ops._resources import EN_STOPWORDS, FLAGGED_WORDS

# -- per-row python implementations of the recipe OPs ------------------------

_HTML = re.compile(r"<[^>]{0,500}>")
_URL = re.compile(r"(?:https?|ftp)://\S+|www\.\S+")
_WS = re.compile(r"[ \t\x0b\f\r]+")


_ENTITIES = [("&nbsp;", " "), ("&amp;", "&"), ("&lt;", "<"), ("&gt;", ">"),
             ("&quot;", '"'), ("&#39;", "'")]


def py_clean_html(text: str) -> str:
    text = _HTML.sub(" ", text)
    for ent, rep in _ENTITIES:
        text = text.replace(ent, rep)
    return text


def py_clean_links(text: str) -> str:
    return _URL.sub("", text)


def py_whitespace(text: str) -> str:
    t = _WS.sub(" ", text)
    t = re.sub(r" ?\n ?", "\n", t)
    return re.sub(r"\n{3,}", "\n\n", t).strip()


def py_remove_long_words(text: str, max_len: int = 40) -> str:
    return " ".join(w for w in text.split(" ") if len(w) <= max_len)


def py_keep_char_count(text: str, lo: int, hi: float) -> bool:
    return lo <= len(text) <= hi


def py_keep_word_count(text: str, lo: int, hi: float) -> bool:
    return lo <= len(text.lower().split()) <= hi


def py_keep_alnum_ratio(text: str, lo: float) -> bool:
    if not text:
        return False
    alnum = sum(c.isalnum() for c in text)
    return alnum / len(text) >= lo


def py_keep_stopword_ratio(text: str, lo: float) -> bool:
    words = text.lower().split()
    if not words:
        return False
    sw = set(EN_STOPWORDS)
    return sum(w in sw for w in words) / len(words) >= lo


def py_keep_flagged(text: str, hi: float) -> bool:
    words = text.lower().split()
    if not words:
        return True
    fl = set(FLAGGED_WORDS)
    return sum(w in fl for w in words) / len(words) <= hi


def py_remove_header(text: str) -> str:
    m = re.search(r"\\(?:section|chapter)\*?\{", text)
    return text[m.start():] if m else text


def py_remove_comments(text: str) -> str:
    text = re.sub(r"(?m)^%[^\n]*\n?", "", text)
    return re.sub(r"(?<!\\)%[^\n]*", "", text)


_MACRO = re.compile(r"\\(?:new|renew)command\*?\{\\(\w+)\}\{([^{}]*)\}")


def py_expand_macro(text: str) -> str:
    macros = dict(_MACRO.findall(text))
    text = _MACRO.sub("", text)
    for name, body in macros.items():
        text = re.sub(r"\\" + re.escape(name) + r"(?![A-Za-z])",
                      body.replace("\\", "\\\\"), text)
    return text


def py_remove_bibliography(text: str) -> str:
    return re.sub(
        r"(?s)(\\begin\{thebibliography\}|\\bibliography\{|\\printbibliography).*$",
        "", text,
    )


@dataclass
class BaselineStep:
    name: str
    kind: str  # "map" | "filter" | "dedup"
    fn: Callable | None = None


#: The Books/arXiv-style cleaning recipe as baseline steps (mirrors the
#: recipes in ``repro.recipes``).
def default_steps() -> list[BaselineStep]:
    return [
        BaselineStep("clean_html", "map", py_clean_html),
        BaselineStep("clean_links", "map", py_clean_links),
        BaselineStep("whitespace", "map", py_whitespace),
        BaselineStep("remove_long_words", "map", py_remove_long_words),
        BaselineStep("char_count", "filter", lambda t: py_keep_char_count(t, 80, 1e9)),
        BaselineStep("word_count", "filter", lambda t: py_keep_word_count(t, 15, 1e9)),
        BaselineStep("alnum_ratio", "filter", lambda t: py_keep_alnum_ratio(t, 0.6)),
        BaselineStep("stopword_ratio", "filter", lambda t: py_keep_stopword_ratio(t, 0.08)),
        BaselineStep("flagged", "filter", lambda t: py_keep_flagged(t, 0.01)),
        BaselineStep("exact_dedup", "dedup"),
    ]


def arxiv_steps() -> list[BaselineStep]:
    """The RedPajama arXiv script's steps, mirroring ARXIV_RECIPE."""
    return [
        BaselineStep("remove_header", "map", py_remove_header),
        BaselineStep("remove_comments", "map", py_remove_comments),
        BaselineStep("expand_macro", "map", py_expand_macro),
        BaselineStep("remove_bibliography", "map", py_remove_bibliography),
        BaselineStep("whitespace", "map", py_whitespace),
        BaselineStep("char_count", "filter", lambda t: py_keep_char_count(t, 80, 1e9)),
        BaselineStep("word_count", "filter", lambda t: py_keep_word_count(t, 15, 1e9)),
        BaselineStep("alnum_ratio", "filter", lambda t: py_keep_alnum_ratio(t, 0.55)),
        BaselineStep("exact_dedup", "dedup"),
    ]


def books_steps() -> list[BaselineStep]:
    """RedPajama-Books-style steps, mirroring BOOKS_RECIPE's shape."""
    return [
        BaselineStep("whitespace", "map", py_whitespace),
        BaselineStep("char_count", "filter", lambda t: py_keep_char_count(t, 200, 1e9)),
        BaselineStep("word_count", "filter", lambda t: py_keep_word_count(t, 30, 1e9)),
        BaselineStep("stopword_ratio", "filter", lambda t: py_keep_stopword_ratio(t, 0.1)),
        BaselineStep("exact_dedup", "dedup"),
    ]


@dataclass
class BaselineReport:
    step_seconds: dict[str, float] = field(default_factory=dict)
    total_seconds: float = 0.0


def run_baseline(df: DataFrame, workdir: str,
                 steps: list[BaselineStep] | None = None) -> tuple[DataFrame, BaselineReport]:
    """Execute the per-OP eager baseline; returns (result, report)."""
    steps = steps if steps is not None else default_steps()
    spark = df.sparkSession
    os.makedirs(workdir, exist_ok=True)
    report = BaselineReport()
    t_all = time.perf_counter()
    path = os.path.join(workdir, "step_000_load")
    df.write.mode("overwrite").json(path)
    df = spark.read.schema(schema.DJ_SCHEMA).json(path)
    for i, step in enumerate(steps, start=1):
        t0 = time.perf_counter()
        if step.kind == "map":
            udf = F.udf(step.fn, T.StringType())
            df = df.withColumn(schema.TEXT_COL, udf(F.col(schema.TEXT_COL)))
        elif step.kind == "filter":
            udf = F.udf(step.fn, T.BooleanType())
            df = df.filter(udf(F.col(schema.TEXT_COL)))
        elif step.kind == "dedup":
            udf = F.udf(
                lambda t: __import__("hashlib").sha256(
                    re.sub(r"\s+", " ", t.lower().strip()).encode()
                ).hexdigest(),
                T.StringType(),
            )
            df = df.withColumn("_h", udf(F.col(schema.TEXT_COL))).dropDuplicates(["_h"]).drop("_h")
        else:  # pragma: no cover - config error
            raise ValueError(step.kind)
        path = os.path.join(workdir, f"step_{i:03d}_{step.name}")
        df.write.mode("overwrite").json(path)
        df = spark.read.schema(schema.DJ_SCHEMA).json(path)
        report.step_seconds[step.name] = time.perf_counter() - t0
    report.total_seconds = time.perf_counter() - t_all
    return df, report


def cleanup(workdir: str) -> None:
    shutil.rmtree(workdir, ignore_errors=True)
