"""Analyzer — the 13-dimension data probe (paper Sec. 5.2)."""
import pytest
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.analyzer import DEFAULT_DIMENSIONS, Analyzer
from repro.oracle import assert_equivalent


def test_thirteen_default_dimensions():
    assert len(DEFAULT_DIMENSIONS) == 13


@pytest.fixture(scope="module")
def analyzer():
    return Analyzer()


def test_compute_stats_attaches_all_keys(analyzer, mixed_df):
    st = analyzer.compute_stats(mixed_df).first()["stats"]
    assert set(analyzer.stat_keys) <= set(st)


def test_compute_stats_keeps_all_rows(analyzer, mixed_df):
    # The decoupling benefit: stats over the WHOLE dataset, no filtering.
    assert analyzer.compute_stats(mixed_df).count() == mixed_df.count()


def test_summary_shape(analyzer, mixed_df):
    summary = analyzer.summary(mixed_df)
    assert list(summary["dimension"]) == list(analyzer.stat_keys)
    assert set(summary.columns) == {
        "dimension", "count", "mean", "std", "min", "q25", "median", "q75", "max"
    }


def test_summary_count_equals_rows(analyzer, mixed_df):
    summary = analyzer.summary(mixed_df)
    assert (summary["count"] == mixed_df.count()).all()


def test_summary_min_le_median_le_max(analyzer, mixed_df):
    s = analyzer.summary(mixed_df)
    assert (s["min"] <= s["median"]).all() and (s["median"] <= s["max"]).all()


def test_summary_mean_matches_duckdb(analyzer, mixed_df):
    stats_df = analyzer.compute_stats(mixed_df).cache()
    got = stats_df.select(schema.stat("char_count").alias("v")).agg(
        F.count("v").cast("long").alias("n"),
        F.mean("v").alias("mean"),
        F.min("v").alias("mn"),
        F.max("v").alias("mx"),
    )
    flat = stats_df.select(schema.stat("char_count").alias("v"))
    assert_equivalent(
        got,
        "SELECT count(v)::BIGINT AS n, avg(v) AS mean, min(v) AS mn, max(v) AS mx FROM d",
        d=flat,
    )


def test_summary_separates_clean_noisy(analyzer, clean_df, noisy_df):
    s_clean = analyzer.summary(clean_df).set_index("dimension")
    s_noisy = analyzer.summary(noisy_df).set_index("dimension")
    assert s_clean.loc["stopword_ratio", "mean"] > s_noisy.loc["stopword_ratio", "mean"]
    assert s_clean.loc["perplexity", "mean"] < s_noisy.loc["perplexity", "mean"]


def test_custom_dimensions():
    a = Analyzer(dimensions=("char_count_filter", "line_count_filter"))
    assert a.stat_keys == ["char_count", "line_count"]


def test_summary_computed_flag(analyzer, mixed_df):
    pre = analyzer.compute_stats(mixed_df)
    s = analyzer.summary(pre, computed=True)
    assert (s["count"] == mixed_df.count()).all()
