"""Property-based tests (hypothesis) over the pure-Python pieces —
baseline OP functions, union–find, HPO sampling. Spark-side behaviour
is covered by example-based tests; these pin down the driver-side
algorithms on arbitrary inputs."""
import math

from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.hpo import _perturb, _sample
from repro.ops._resources import COMMON_WORD_LOGPROB, OOV_LOGPROB
from repro.ops.dedup import _union_find
from repro.sysopt.baseline import (
    py_clean_html,
    py_clean_links,
    py_expand_macro,
    py_keep_alnum_ratio,
    py_keep_char_count,
    py_keep_stopword_ratio,
    py_keep_word_count,
    py_remove_long_words,
    py_whitespace,
)

import numpy as np

text_st = st.text(max_size=300)


@given(text_st)
@settings(max_examples=80, deadline=None)
def test_whitespace_idempotent(t):
    once = py_whitespace(t)
    assert py_whitespace(once) == once


@given(text_st)
@settings(max_examples=80, deadline=None)
def test_whitespace_no_double_spaces(t):
    assert "  " not in py_whitespace(t).replace("\n", "|")


@given(text_st)
@settings(max_examples=80, deadline=None)
def test_clean_html_no_tags_left(t):
    assert not any(
        "<" in chunk and ">" in chunk and len(chunk) < 500
        for chunk in [py_clean_html(t)]
        if "<" in chunk and ">" in chunk and
        __import__("re").search(r"<[^>]{0,500}>", chunk)
    )


@given(text_st)
@settings(max_examples=80, deadline=None)
def test_clean_links_removes_urls(t):
    out = py_clean_links(t + " http://x.example/a")
    assert "http://x.example/a" not in out


@given(text_st, st.integers(1, 50))
@settings(max_examples=80, deadline=None)
def test_remove_long_words_bound(t, max_len):
    out = py_remove_long_words(t, max_len)
    assert all(len(w) <= max_len for w in out.split(" ") if w)


@given(text_st)
@settings(max_examples=80, deadline=None)
def test_expand_macro_removes_definitions(t):
    src = t + "\\newcommand{\\zz}{body text}"
    assert "newcommand" not in py_expand_macro(src)


@given(text_st, st.integers(0, 100))
@settings(max_examples=60, deadline=None)
def test_char_count_filter_consistent(t, lo):
    assert py_keep_char_count(t, lo, 1e18) == (len(t) >= lo)


@given(text_st)
@settings(max_examples=60, deadline=None)
def test_word_count_monotone_in_threshold(t):
    # keeping at a lower threshold is implied by keeping at a higher one
    if py_keep_word_count(t, 10, 1e18):
        assert py_keep_word_count(t, 5, 1e18)


@given(text_st)
@settings(max_examples=60, deadline=None)
def test_ratio_filters_bounded(t):
    assert py_keep_alnum_ratio(t, 0.0) == (len(t) > 0)
    assert isinstance(py_keep_stopword_ratio(t, 0.5), bool)


@given(st.lists(st.tuples(st.integers(0, 30), st.integers(0, 30)), max_size=60))
@settings(max_examples=80, deadline=None)
def test_union_find_partition(pairs):
    pairs = [(f"n{a}", f"n{b}") for a, b in pairs]
    clusters = _union_find(pairs)
    # representative is a fixpoint, and in the same component as member
    for x, rep in clusters.items():
        assert clusters[rep] == rep
    # connected pairs share a representative
    for a, b in pairs:
        assert clusters[a] == clusters[b]


@given(st.lists(st.tuples(st.integers(0, 20), st.integers(0, 20)), max_size=40))
@settings(max_examples=50, deadline=None)
def test_union_find_representative_is_min(pairs):
    pairs = [(f"n{a:02d}", f"n{b:02d}") for a, b in pairs]
    clusters = _union_find(pairs)
    comps: dict[str, set] = {}
    for x, rep in clusters.items():
        comps.setdefault(rep, set()).add(x)
    for rep, members in comps.items():
        assert rep == min(members | {rep})


@given(st.integers(0, 2**31 - 1))
@settings(max_examples=50, deadline=None)
def test_hpo_sample_in_bounds(seed):
    rng = np.random.default_rng(seed)
    space = {"x": (0.0, 1.0), "n": (1, 9), "c": ["a", "b"]}
    p = _sample(space, rng)
    assert 0.0 <= p["x"] <= 1.0
    assert 1 <= p["n"] <= 9 and isinstance(p["n"], int)
    assert p["c"] in ("a", "b")


@given(st.integers(0, 2**31 - 1))
@settings(max_examples=50, deadline=None)
def test_hpo_perturb_stays_in_bounds(seed):
    rng = np.random.default_rng(seed)
    space = {"x": (0.0, 1.0)}
    p = _perturb({"x": 0.5}, space, rng)
    assert 0.0 <= p["x"] <= 1.0


def test_logprob_table_normalized_enough():
    # The unigram table must be a subprobability distribution.
    total = sum(math.exp(lp) for lp in COMMON_WORD_LOGPROB.values())
    assert 0 < total < 1
    assert all(lp > OOV_LOGPROB for lp in COMMON_WORD_LOGPROB.values())
