"""Cache/checkpoint manager + App. A.2 space model."""
import os

import pytest

from repro.core import schema
from repro.core.checkpoint import (
    CacheManager,
    cache_mode_space,
    checkpoint_mode_space,
)
from repro.core.config import load_recipe
from repro.core.pipeline import Pipeline


def test_space_model_cache_mode():
    # (1 + M + F + 1[F>0] + D) × S
    assert cache_mode_space(2, 3, 1, 10.0) == (1 + 2 + 3 + 1 + 1) * 10.0
    assert cache_mode_space(2, 0, 1, 10.0) == (1 + 2 + 0 + 0 + 1) * 10.0


def test_space_model_checkpoint_mode():
    assert checkpoint_mode_space(7.0) == 21.0


def test_save_load_roundtrip(tmp_path, spark, mixed_df):
    cm = CacheManager(str(tmp_path / "c"))
    path = cm.save(mixed_df, 0, "load")
    back = cm.load(spark, path)
    assert sorted(schema.texts_of(back)) == sorted(schema.texts_of(mixed_df))


def test_cache_mode_set_count_matches_a2(tmp_path, mixed_df):
    """Measured cache-set count equals the A.2 cache-mode formula.

    Recipe: M=2 mappers, F=2 filters, D=1 dedup in lazy mode; our
    implementation adds stats with each filter's cache (the formula's
    extra +1 for the first Filter is folded into per-OP sets, so sets ==
    1 + #OPs; the byte-level formula is asserted separately above).
    """
    rec = load_recipe({
        "name": "c", "process": [
            {"lowercase_mapper": {}}, {"whitespace_normalization_mapper": {}},
            {"char_count_filter": {"min_val": 1}}, {"word_count_filter": {"min_val": 1}},
            {"document_dedup": {}},
        ],
    })
    cm = CacheManager(str(tmp_path / "c"), mode="cache")
    Pipeline(rec, mode="eager_cache", cache=cm).run(mixed_df).count()
    assert len(cm.cache_sets()) == 1 + 5


def test_checkpoint_mode_keeps_at_most_three(tmp_path, mixed_df):
    rec = load_recipe({
        "name": "c", "process": [
            {"lowercase_mapper": {}}, {"whitespace_normalization_mapper": {}},
            {"char_count_filter": {"min_val": 1}}, {"word_count_filter": {"min_val": 1}},
            {"document_dedup": {}},
        ],
    })
    cm = CacheManager(str(tmp_path / "c"), mode="checkpoint")
    Pipeline(rec, mode="eager_cache", cache=cm).run(mixed_df).count()
    # A.2: original + at most two in-flight sets.
    assert len(cm.cache_sets()) <= 3


def test_latest_points_to_survivor(tmp_path, mixed_df):
    cm = CacheManager(str(tmp_path / "c"), mode="checkpoint")
    cm.save(mixed_df, 0, "load")
    cm.save(mixed_df, 1, "op1")
    cm.save(mixed_df, 2, "op2")
    cm.save(mixed_df, 3, "op3")
    assert cm.latest().endswith("003_op3")
    assert os.path.isdir(cm.latest())


def test_resume_from_latest(tmp_path, spark, mixed_df):
    """Recovery: reload the newest checkpoint and continue (Sec. 5.1.1)."""
    cm = CacheManager(str(tmp_path / "c"), mode="checkpoint")
    cm.save(mixed_df, 0, "load")
    half = mixed_df.limit(5)
    cm.save(half, 1, "halfway")
    resumed = cm.load(spark, cm.latest())
    assert resumed.count() == 5


@pytest.mark.parametrize("codec", ["gzip", "bzip2"])
def test_compression_roundtrip(tmp_path, spark, mixed_df, codec):
    cm = CacheManager(str(tmp_path / codec), compression=codec)
    path = cm.save(mixed_df, 0, "load")
    ext = {"gzip": ".gz", "bzip2": ".bz2"}[codec]
    files = [f for f in os.listdir(path) if f.endswith(ext)]
    assert files, f"no {ext} cache files written"
    back = cm.load(spark, path)
    assert sorted(schema.texts_of(back)) == sorted(schema.texts_of(mixed_df))


def test_compression_shrinks_cache(tmp_path, spark):
    # Highly repetitive text → compression must clearly shrink the cache.
    df = schema.from_texts(spark, ["the same line repeated " * 200] * 20)
    plain = CacheManager(str(tmp_path / "p"))
    gz = CacheManager(str(tmp_path / "g"), compression="gzip")
    plain.save(df, 0, "x")
    gz.save(df, 0, "x")
    assert gz.total_bytes() < 0.5 * plain.total_bytes()


def test_bad_mode_and_codec(tmp_path):
    with pytest.raises(ValueError):
        CacheManager(str(tmp_path), mode="nope")
    with pytest.raises(ValueError):
        CacheManager(str(tmp_path), compression="zstd-not-here")


def test_clear(tmp_path, mixed_df):
    cm = CacheManager(str(tmp_path / "c"))
    cm.save(mixed_df, 0, "x")
    cm.clear()
    assert cm.cache_sets() == [] and cm.total_bytes() == 0
