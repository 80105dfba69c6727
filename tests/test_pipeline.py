"""Pipeline executor — mode equivalence, reports, eager caching."""
import pytest

from repro.core import schema
from repro.core.checkpoint import CacheManager
from repro.core.config import load_recipe
from repro.core.pipeline import Pipeline, run_recipe
from repro.core.registry import get_op
from repro.core.tracer import Tracer

RECIPE = load_recipe({
    "name": "t",
    "process": [
        {"clean_html_mapper": {}},
        {"whitespace_normalization_mapper": {}},
        {"char_count_filter": {"min_val": 30}},
        {"word_count_filter": {"min_val": 5}},
        {"stopword_ratio_filter": {"min_val": 0.05}},
        {"document_dedup": {}},
    ],
})


def test_lazy_and_fused_agree(mixed_df):
    lazy = Pipeline(RECIPE, mode="lazy").run(mixed_df)
    fused = Pipeline(RECIPE, mode="fused").run(mixed_df)
    assert sorted(schema.texts_of(lazy)) == sorted(schema.texts_of(fused))


def test_eager_cache_agrees(tmp_path, mixed_df):
    cache = CacheManager(str(tmp_path / "c"))
    eager = Pipeline(RECIPE, mode="eager_cache", cache=cache).run(mixed_df)
    fused = Pipeline(RECIPE, mode="fused").run(mixed_df)
    assert sorted(schema.texts_of(eager)) == sorted(schema.texts_of(fused))


def test_eager_needs_cache(mixed_df):
    with pytest.raises(ValueError, match="CacheManager"):
        Pipeline(RECIPE, mode="eager_cache")


def test_unknown_mode():
    with pytest.raises(ValueError, match="unknown exec mode"):
        Pipeline(RECIPE, mode="bogus")


def test_report_lists_effective_ops(mixed_df):
    pipe = Pipeline(RECIPE, mode="fused")
    pipe.run(mixed_df).count()
    assert pipe.report.mode == "fused"
    assert any(name.startswith("fused(") for name in pipe.report.ops)


def test_report_lazy_keeps_op_list(mixed_df):
    pipe = Pipeline(RECIPE, mode="lazy")
    pipe.run(mixed_df).count()
    assert pipe.report.ops == [
        "clean_html_mapper", "whitespace_normalization_mapper",
        "char_count_filter", "word_count_filter", "stopword_ratio_filter",
        "document_dedup",
    ]


def test_profile_records_op_seconds(mixed_df):
    pipe = Pipeline(RECIPE, mode="lazy", profile=True)
    pipe.run(mixed_df)
    assert set(pipe.report.op_seconds) == set(pipe.report.ops)
    assert all(t >= 0 for t in pipe.report.op_seconds.values())


def test_eager_cache_writes_per_op(tmp_path, mixed_df):
    cache = CacheManager(str(tmp_path / "c"))
    pipe = Pipeline(RECIPE, mode="eager_cache", cache=cache)
    pipe.run(mixed_df).count()
    # load + one per OP (fusion off in eager mode list? eager uses effective ops)
    assert len(pipe.report.cache_paths) == len(pipe.effective_ops()) + 1


def test_pipeline_with_op_list(mixed_df):
    ops = [get_op("char_count_filter", min_val=30)]
    out = Pipeline(ops, mode="lazy").run(mixed_df)
    assert 0 < out.count() < mixed_df.count()


def test_run_recipe_helper(mixed_df):
    out, report = run_recipe(mixed_df, RECIPE)
    assert out.count() > 0
    assert report.total_seconds >= 0


def test_tracer_integration(mixed_df):
    tracer = Tracer(sample_limit=3)
    Pipeline(RECIPE, mode="lazy", tracer=tracer).run(mixed_df).count()
    kinds = {r.op_name: r.kind for r in tracer.records}
    assert kinds["clean_html_mapper"] == "mapper"
    assert kinds["document_dedup"] == "deduplicator"
    assert len(tracer.records) == 6


def test_recipe_mode_from_recipe(mixed_df):
    rec = load_recipe({"name": "m", "exec_mode": "lazy",
                       "process": [{"char_count_filter": {"min_val": 1}}]})
    pipe = Pipeline(rec)
    assert pipe.mode == "lazy"
