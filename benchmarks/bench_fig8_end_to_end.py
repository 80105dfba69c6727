"""Figure 8 (§8.2.1) — end-to-end: RedPajama-style baseline vs Data-Juicer.

Regenerates the Fig. 8 comparison at benchmark scale: same logical
recipe over the Books and arXiv synthetic datasets, once with the
per-OP-materializing python-UDF baseline and once with the fused lazy
Data-Juicer pipeline. The paper reports avg 55.6% / max 88.7% time
savings; the shape asserted here is "Data-Juicer is faster".
"""
import time

import pytest

from repro.core.pipeline import run_recipe
from repro.recipes import ARXIV_RECIPE, BOOKS_RECIPE
from repro.sysopt.baseline import arxiv_steps, books_steps, run_baseline

_RESULTS: dict[str, float] = {}


def _bench_baseline(benchmark, df, tmp_path, key, steps):
    def run():
        out, _ = run_baseline(df, str(tmp_path / "w"), steps)
        return out.count()

    benchmark.pedantic(run, rounds=1, iterations=1)
    _RESULTS[key] = benchmark.stats.stats.mean


def _bench_dj(benchmark, df, recipe, key):
    def run():
        out, _ = run_recipe(df, recipe, mode="fused")
        return out.count()

    benchmark.pedantic(run, rounds=1, iterations=1)
    _RESULTS[key] = benchmark.stats.stats.mean


@pytest.mark.benchmark(group="fig8-books")
def test_books_baseline(benchmark, books_df, tmp_path):
    _bench_baseline(benchmark, books_df, tmp_path, "books_baseline", books_steps())


@pytest.mark.benchmark(group="fig8-books")
def test_books_data_juicer(benchmark, books_df):
    _bench_dj(benchmark, books_df, BOOKS_RECIPE, "books_dj")
    if "books_baseline" in _RESULTS:
        assert _RESULTS["books_dj"] < _RESULTS["books_baseline"]


@pytest.mark.benchmark(group="fig8-arxiv")
def test_arxiv_baseline(benchmark, arxiv_df, tmp_path):
    _bench_baseline(benchmark, arxiv_df, tmp_path, "arxiv_baseline", arxiv_steps())


@pytest.mark.benchmark(group="fig8-arxiv")
def test_arxiv_data_juicer(benchmark, arxiv_df):
    _bench_dj(benchmark, arxiv_df, ARXIV_RECIPE, "arxiv_dj")
    if "arxiv_baseline" in _RESULTS:
        assert _RESULTS["arxiv_dj"] < _RESULTS["arxiv_baseline"]
