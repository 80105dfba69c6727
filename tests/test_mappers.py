"""Mapper OPs — in-place text editing behaviour."""
import pytest

from repro.core import schema
from repro.core.registry import get_op, ops_by_category
from repro.oracle import assert_equivalent

from pyspark.sql import functions as F

MAPPERS = ops_by_category()["mapper"]


def _one(spark, name, text, **params):
    df = schema.from_texts(spark, [text])
    return get_op(name, **params)(df).first()["text"]


@pytest.mark.parametrize("name", MAPPERS)
def test_mapper_preserves_schema_and_count(spark, mixed_df, name):
    out = get_op(name)(mixed_df)
    assert out.columns == ["text", "meta", "stats"]
    assert out.count() == mixed_df.count()


@pytest.mark.parametrize("name", MAPPERS)
def test_mapper_idempotent_on_plain_text(spark, name):
    # A second application to already-clean prose must be a no-op.
    base = "the quick brown fox jumps over the lazy dog"
    once = _one(spark, name, base)
    twice = _one(spark, name, once)
    assert once == twice


def test_whitespace_normalization(spark):
    out = _one(spark, "whitespace_normalization_mapper", "a   b\t\tc  \n\n\n\nd  ")
    assert out == "a b c\n\nd"


def test_punctuation_normalization(spark):
    out = _one(spark, "punctuation_normalization_mapper", "\u201cquote\u201d \u2013 a\u2026")
    assert out == '"quote" - a...'


def test_fix_unicode_strips_control(spark):
    out = _one(spark, "fix_unicode_mapper", "a\x00b\x07c ﬁne")
    assert out == "abc fine"  # NFKC folds the ﬁ ligature too


def test_lowercase(spark):
    assert _one(spark, "lowercase_mapper", "AbC") == "abc"


def test_clean_html(spark):
    out = _one(spark, "clean_html_mapper", "<p>Hello &amp; <b>World</b></p>")
    assert "Hello &" in out and "<" not in out


def test_clean_links(spark):
    out = _one(spark, "clean_links_mapper", "see https://a.b/c and www.x.y now")
    assert "https" not in out and "www" not in out and "see" in out


def test_clean_email(spark):
    assert "@" not in _one(spark, "clean_email_mapper", "mail a.b+c@d-e.org please")


def test_clean_ip(spark):
    assert "10.0.0.1" not in _one(spark, "clean_ip_mapper", "host 10.0.0.1 up")


def test_clean_copyright(spark):
    src = "# Copyright 2023 Foo\n# Licensed under MIT\ndef f():\n    pass"
    out = _one(spark, "clean_copyright_mapper", src)
    assert out.startswith("def f()")


def test_remove_header(spark):
    src = "\\documentclass{article}\n\\title{X}\n\\section{Intro}\nbody"
    out = _one(spark, "remove_header_mapper", src)
    assert out.startswith("\\section{Intro}")


def test_remove_header_no_section_untouched(spark):
    src = "plain text without sections"
    assert _one(spark, "remove_header_mapper", src) == src


def test_remove_bibliography(spark):
    src = "body\n\\begin{thebibliography}{9}\\bibitem{a} A.\\end{thebibliography}"
    out = _one(spark, "remove_bibliography_mapper", src)
    assert out == "body\n"


def test_remove_comments(spark):
    src = "% full comment\nkeep 50\\% of it % trailing\nnext"
    out = _one(spark, "remove_comments_mapper", src)
    assert out == "keep 50\\% of it \nnext"


def test_expand_macro(spark):
    src = "\\newcommand{\\eg}{for example}\nUse \\eg here"
    out = _one(spark, "expand_macro_mapper", src)
    assert "for example here" in out and "newcommand" not in out


def test_remove_specific_chars(spark):
    assert _one(spark, "remove_specific_chars_mapper", "a◆b●c") == "abc"


def test_remove_long_words(spark):
    out = _one(spark, "remove_long_words_mapper", "ok " + "x" * 50 + " fine", max_len=10)
    assert out == "ok fine"


def test_remove_table_text(spark):
    src = "prose line\n| a | b | c |\nmore prose"
    out = _one(spark, "remove_table_text_mapper", src)
    assert "| a |" not in out and "prose line" in out


def test_remove_repeat_sentences(spark):
    src = "a\na\nb\nb\nb\na"
    assert _one(spark, "remove_repeat_sentences_mapper", src) == "a\nb\na"


def test_sentence_split(spark):
    out = _one(spark, "sentence_split_mapper", "One here. Two there. Done")
    assert out == "One here.\nTwo there.\nDone"


def test_truncate(spark):
    assert _one(spark, "truncate_mapper", "abcdef", max_chars=3) == "abc"


def test_lowercase_matches_duckdb(spark, clean_df):
    out = get_op("lowercase_mapper")(clean_df).select(F.col("text").alias("t"))
    assert_equivalent(out, "SELECT lower(text) AS t FROM d", d=clean_df.select("text"))


def test_truncate_matches_duckdb(spark, clean_df):
    out = get_op("truncate_mapper", max_chars=10)(clean_df).select(F.col("text").alias("t"))
    assert_equivalent(out, "SELECT substring(text, 1, 10) AS t FROM d",
                      d=clean_df.select("text"))
