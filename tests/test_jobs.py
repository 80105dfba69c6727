"""Smoke tests of the cheap table-job entrypoints (the heavy ones —
Tables 2-5, Figures 8-10 — run under benchmarks/ and as jobs)."""
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "jobs")
sys.path.insert(0, JOBS_DIR)


@pytest.fixture(scope="module")
def sink():
    lines = []

    def out(*args):
        lines.append(" ".join(str(a) for a in args))

    out.lines = lines
    return out


def test_table1_inventory(sink):
    import table1_op_pool

    cats = table1_op_pool.run(out=sink)
    assert sum(len(v) for v in cats.values()) > 50
    assert any("over 50" in ln for ln in sink.lines)


def test_table7_small_scale(spark, sink):
    import table7_pretrain_recipe

    result = table7_pretrain_recipe.run(spark, scale=2e-8, out=sink)
    assert len(result) == 15
    # CommonCrawl must dominate the mixture like in the paper.
    props = {k: v[1] for k, v in result.items()}
    assert max(props, key=props.get) == "commoncrawl"
    # epoch boosts: wikipedia proportion exceeds its raw token share.
    toks = {k: v[0] for k, v in result.items()}
    raw_share = 100 * toks["wikipedia"] / sum(toks.values())
    assert props["wikipedia"] > raw_share


def test_table8_counts_match_paper(spark, sink):
    import table8_posttuning_stats

    ours = table8_posttuning_stats.run(spark, out=sink)
    assert ours == table8_posttuning_stats.PAPER_T8


def test_table4_show_config(sink):
    import table4_quality_classifier

    table4_quality_classifier.show_config(out=sink)
    assert any("sentencepiece" in ln for ln in sink.lines)
