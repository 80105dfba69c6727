"""OP fusion and reordering (paper Sec. 7, Fig. 6) — structure and
result-equivalence."""
import pytest

from repro.core import fusion, schema
from repro.core.fusion import FusedFilter, detect_groups, optimize
from repro.core.registry import get_op
from tests.conftest import stats_of


def _filters():
    return [
        get_op("char_count_filter", min_val=20),
        get_op("word_count_filter", min_val=4),
        get_op("stopword_ratio_filter", min_val=0.05),
        get_op("avg_word_length_filter", max_val=15),
    ]


def test_detect_groups_single_run():
    ops = [get_op("clean_html_mapper")] + _filters() + [get_op("document_dedup")]
    assert detect_groups(ops) == [(1, 4)]


def test_detect_groups_two_runs():
    ops = (_filters()[:2] + [get_op("clean_html_mapper")] + _filters()[2:])
    assert detect_groups(ops) == [(0, 1), (3, 4)]


def test_optimize_fuses_context_filters():
    opt = optimize(_filters())
    fused = [o for o in opt if isinstance(o, FusedFilter)]
    assert len(fused) == 1
    assert {m.name for m in fused[0].members} == {
        "word_count_filter", "stopword_ratio_filter", "avg_word_length_filter"
    }


def test_optimize_leaves_contextless_alone():
    opt = optimize([get_op("char_count_filter"), get_op("alnum_ratio_filter")])
    assert not any(isinstance(o, FusedFilter) for o in opt)


def test_optimize_preserves_non_filter_positions():
    ops = [get_op("clean_html_mapper")] + _filters() + [get_op("document_dedup")]
    opt = optimize(ops)
    assert opt[0].name == "clean_html_mapper"
    assert opt[-1].name == "document_dedup"


def test_reorder_cheap_first():
    expensive = get_op("text_entropy_filter", min_val=0.0)
    cheap = get_op("char_count_filter", min_val=1)
    opt = optimize([expensive, cheap], fuse=False)
    assert [o.name for o in opt] == ["char_count_filter", "text_entropy_filter"]


def test_fused_filter_needs_members():
    with pytest.raises(ValueError):
        FusedFilter([])


def test_fused_metadata():
    f = FusedFilter(_filters()[1:])
    assert f.context_keys == ("words",)
    assert f.cost == sum(m.cost for m in _filters()[1:])
    assert f.selectivity < min(m.selectivity for m in _filters()[1:])


def test_fused_stats_match_individual(mixed_df):
    """The fused projection computes exactly the member stats."""
    members = _filters()[1:]
    fused_df = FusedFilter(members).compute_stats(mixed_df)
    for m in members:
        solo_vals = stats_of(m.compute_stats(mixed_df), m.stat_key)
        fused_vals = stats_of(fused_df, m.stat_key)
        assert fused_vals == solo_vals


def test_fused_result_equals_sequential(mixed_df):
    """Fusion must not change which samples survive."""
    seq = mixed_df
    for f in _filters():
        seq = f(seq)
    fused = mixed_df
    for op in optimize(_filters()):
        fused = op(fused)
    assert sorted(schema.texts_of(seq)) == sorted(schema.texts_of(fused))


def test_fused_drops_context_columns(mixed_df):
    out = FusedFilter(_filters()[1:]).compute_stats(mixed_df)
    assert not [c for c in out.columns if c.startswith("_ctx_")]


def test_reorder_is_stable_under_equal_cost():
    a = get_op("char_count_filter")
    b = get_op("alnum_ratio_filter")
    opt1 = [o.name for o in optimize([a, b], fuse=False)]
    opt2 = [o.name for o in optimize([a, b], fuse=False)]
    assert opt1 == opt2


def test_fuse_group_single_context_filter_kept_as_is():
    out = fusion.fuse_group([get_op("word_count_filter")])
    assert len(out) == 1 and not isinstance(out[0], FusedFilter)
