"""Filter OPs — stats computation, predicates, and DuckDB oracle checks."""
import math

import pytest
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.registry import get_op, ops_by_category
from repro.oracle import assert_equivalent
from tests.conftest import CLEAN, NOISY, stats_of

FILTERS = ops_by_category()["filter"]


@pytest.mark.parametrize("name", FILTERS)
def test_filter_schema_preserved(mixed_df, name):
    out = get_op(name)(mixed_df)
    assert out.columns == ["text", "meta", "stats"]


@pytest.mark.parametrize("name", FILTERS)
def test_compute_stats_keeps_all_rows(mixed_df, name):
    op = get_op(name)
    assert op.compute_stats(mixed_df).count() == mixed_df.count()


@pytest.mark.parametrize("name", [n for n in FILTERS
                                  if n not in ("meta_field_filter", "quality_score_filter")])
def test_stats_key_present_and_finite(mixed_df, name):
    op = get_op(name)
    vals = stats_of(op.compute_stats(mixed_df), op.stat_key)
    assert all(v is not None and math.isfinite(v) for v in vals)


@pytest.mark.parametrize("name", FILTERS)
def test_process_subset_of_input(mixed_df, name):
    out = get_op(name)(mixed_df)
    assert out.count() <= mixed_df.count()


# -- per-filter semantics ----------------------------------------------------

def test_char_count_values(spark):
    df = schema.from_texts(spark, ["abc", "abcdef"])
    assert stats_of(get_op("char_count_filter").compute_stats(df), "char_count") == [3.0, 6.0]


def test_char_count_oracle(spark, mixed_df):
    out = get_op("char_count_filter", min_val=30)(mixed_df).select(F.col("text").alias("t"))
    assert_equivalent(out, "SELECT text AS t FROM d WHERE length(text) >= 30",
                      d=mixed_df.select("text"))


def test_word_count_values(spark):
    df = schema.from_texts(spark, ["one two three", "  a  b  "])
    assert stats_of(get_op("word_count_filter").compute_stats(df), "word_count") == [3.0, 2.0]


def test_word_count_oracle(spark, mixed_df):
    out = get_op("word_count_filter", min_val=5)(mixed_df).select(F.col("text").alias("t"))
    sql = ("SELECT text AS t FROM d WHERE "
           "length(list_filter(string_split_regex(lower(text), '\\s+'), x -> x <> '')) >= 5")
    assert_equivalent(out, sql, d=mixed_df.select("text"))


def test_line_count(spark):
    df = schema.from_texts(spark, ["a\nb\nc", "single"])
    assert stats_of(get_op("line_count_filter").compute_stats(df), "line_count") == [3.0, 1.0]


def test_avg_word_length(spark):
    df = schema.from_texts(spark, ["ab abcd"])  # (2+4)/2
    assert stats_of(get_op("avg_word_length_filter").compute_stats(df), "avg_word_len") == [3.0]


def test_max_line_length(spark):
    df = schema.from_texts(spark, ["ab\nabcdef\nx"])
    assert stats_of(get_op("max_line_length_filter").compute_stats(df), "max_line_len") == [6.0]


def test_avg_line_length(spark):
    df = schema.from_texts(spark, ["ab\nabcd"])  # (2+4)/2
    assert stats_of(get_op("avg_line_length_filter").compute_stats(df), "avg_line_len") == [3.0]


def test_alnum_ratio(spark):
    df = schema.from_texts(spark, ["ab!!"])  # 2/4
    assert stats_of(get_op("alnum_ratio_filter").compute_stats(df), "alnum_ratio") == [0.5]


def test_alnum_ratio_oracle(spark, mixed_df):
    out = get_op("alnum_ratio_filter", min_val=0.5)(mixed_df).select(F.col("text").alias("t"))
    sql = ("SELECT text AS t FROM d WHERE length(text) > 0 AND "
           "length(regexp_replace(text, '[^0-9A-Za-z]', '', 'g'))::DOUBLE / length(text) >= 0.5")
    assert_equivalent(out, sql, d=mixed_df.select("text"))


def test_alpha_ratio(spark):
    df = schema.from_texts(spark, ["ab12"])
    assert stats_of(get_op("alpha_ratio_filter").compute_stats(df), "alpha_ratio") == [0.5]


def test_digit_ratio(spark):
    df = schema.from_texts(spark, ["ab12"])
    assert stats_of(get_op("digit_ratio_filter").compute_stats(df), "digit_ratio") == [0.5]


def test_special_char_ratio(spark):
    df = schema.from_texts(spark, ["ab!?"])
    assert stats_of(get_op("special_char_ratio_filter").compute_stats(df),
                    "special_char_ratio") == [0.5]


def test_whitespace_ratio(spark):
    df = schema.from_texts(spark, ["a b"])
    vals = stats_of(get_op("whitespace_ratio_filter").compute_stats(df), "whitespace_ratio")
    assert vals == [pytest.approx(1 / 3)]


def test_char_repetition_flags_degenerate(spark):
    df = schema.from_texts(spark, ["aaaaaaaaaaaaaaaa", CLEAN[0]])
    vals = stats_of(get_op("char_repetition_filter").compute_stats(df), "char_rep_ratio")
    assert vals[0] > 0.9 and vals[1] < 0.9


def test_stopword_ratio_separates(spark):
    df = schema.from_texts(spark, [CLEAN[0], NOISY[6]])
    vals = stats_of(get_op("stopword_ratio_filter").compute_stats(df), "stopword_ratio")
    assert vals[0] > 0.3 and vals[1] == 0.0


def test_flagged_words(spark):
    df = schema.from_texts(spark, ["flaggedterm is here with other words", CLEAN[0]])
    vals = stats_of(get_op("flagged_words_filter").compute_stats(df), "flagged_ratio")
    assert vals[0] > 0 and vals[1] == 0.0


def test_language_score_separates(spark):
    df = schema.from_texts(spark, [CLEAN[0], "的的的 中文中文 没有英文"])
    vals = stats_of(get_op("language_score_filter").compute_stats(df), "lang_score")
    assert vals[0] > 0.5 > vals[1]


def test_perplexity_clean_below_gibberish(spark):
    df = schema.from_texts(spark, [CLEAN[0], NOISY[6]])
    vals = stats_of(get_op("perplexity_filter").compute_stats(df), "perplexity")
    assert vals[0] < vals[1]


def test_word_repetition(spark):
    df = schema.from_texts(spark, ["buy buy buy buy", "all words fully distinct here"])
    vals = stats_of(get_op("word_repetition_filter").compute_stats(df), "word_rep_ratio")
    assert vals[0] == 0.75 and vals[1] == 0.0


def test_token_count(spark):
    df = schema.from_texts(spark, ["one two, three."])
    assert stats_of(get_op("token_count_filter").compute_stats(df), "token_count") == [5.0]


def test_paragraph_count(spark):
    df = schema.from_texts(spark, ["p1 text\n\np2 text\n\n\np3"])
    assert stats_of(get_op("paragraph_count_filter").compute_stats(df),
                    "paragraph_count") == [3.0]


def test_sentence_count(spark):
    df = schema.from_texts(spark, ["One. Two! Three? "])
    assert stats_of(get_op("sentence_count_filter").compute_stats(df),
                    "sentence_count") == [3.0]


def test_text_entropy(spark):
    df = schema.from_texts(spark, ["aaaa", "abcd"])
    vals = stats_of(get_op("text_entropy_filter").compute_stats(df), "char_entropy")
    assert vals[0] == 0.0 and vals[1] == 2.0


def test_meta_field_filter(spark):
    df = schema.from_texts(spark, ["a", "b"], metas=[{"language": "EN"}, {"language": "ZH"}])
    out = get_op("meta_field_filter", key="language", values=("EN",))(df)
    assert schema.texts_of(out) == ["a"]


def test_quality_score_filter(spark):
    df = schema.from_texts(spark, ["good", "bad"])
    df = schema.with_stats(df, {"quality_score": F.when(F.col("text") == "good", 0.9).otherwise(0.1)})
    out = get_op("quality_score_filter", min_val=0.5)(df)
    assert schema.texts_of(out) == ["good"]


def test_quality_score_filter_missing_stat_drops(spark):
    df = schema.from_texts(spark, ["no score yet"])
    assert get_op("quality_score_filter", min_val=0.5)(df).count() == 0


def test_range_filter_max(spark):
    df = schema.from_texts(spark, ["short", "a much longer text body here"])
    out = get_op("char_count_filter", max_val=10)(df)
    assert schema.texts_of(out) == ["short"]


def test_clean_kept_degenerate_dropped_by_stack(spark, mixed_df):
    """The canonical quality stack keeps every clean doc and drops the
    degenerate ones (char runs, shorts, spam repetition, flagged words,
    gibberish). Grammatical boilerplate and raw HTML survive a
    stats-only stack — removing those is Mapper territory, asserted in
    the pipeline tests."""
    df = mixed_df
    for name, kw in [
        ("char_count_filter", {"min_val": 40}),
        ("alnum_ratio_filter", {"min_val": 0.6}),
        ("stopword_ratio_filter", {"min_val": 0.1}),
        ("flagged_words_filter", {"max_val": 0.0}),
        ("word_repetition_filter", {"max_val": 0.7}),
    ]:
        df = get_op(name, **kw)(df)
    kept = set(schema.texts_of(df))
    assert set(CLEAN) <= kept
    for degenerate in (NOISY[0], NOISY[3], NOISY[4], NOISY[5], NOISY[6]):
        assert degenerate not in kept
