"""Tracer — per-OP sample-change records (paper Sec. 5.2)."""
from repro.core import schema
from repro.core.registry import get_op
from repro.core.tracer import Tracer


def test_filter_trace_records_dropped(mixed_df):
    tracer = Tracer(sample_limit=10)
    op = get_op("char_count_filter", min_val=40)
    rec = tracer.trace(op, mixed_df, op(mixed_df))
    assert rec.kind == "filter"
    assert rec.n_dropped == rec.n_before - rec.n_after > 0
    assert len(rec.samples) == min(rec.n_dropped, 10)
    assert all(len(s) < 40 for s in rec.samples)


def test_mapper_trace_records_pairs(spark):
    df = schema.from_texts(spark, ["<b>X</b>", "plain"],
                           metas=[{"id": "1"}, {"id": "2"}])
    tracer = Tracer()
    op = get_op("clean_html_mapper")
    rec = tracer.trace(op, df, op(df))
    assert rec.kind == "mapper"
    assert rec.n_before == rec.n_after == 2
    assert len(rec.samples) == 1  # only the html row changed
    before, after = rec.samples[0]
    assert "<b>" in before and "<b>" not in after


def test_dedup_trace_records_duplicates(dup_df):
    tracer = Tracer()
    op = get_op("document_dedup")
    rec = tracer.trace(op, dup_df, op(dup_df))
    assert rec.kind == "deduplicator"
    assert rec.n_dropped == 2


def test_sample_limit_respected(spark):
    texts = [f"t{i}" for i in range(30)]
    df = schema.from_texts(spark, texts)
    tracer = Tracer(sample_limit=5)
    op = get_op("char_count_filter", min_val=100)
    rec = tracer.trace(op, df, op(df))
    assert rec.n_dropped == 30 and len(rec.samples) == 5


def test_summary_rows(mixed_df):
    tracer = Tracer()
    op = get_op("char_count_filter", min_val=40)
    tracer.trace(op, mixed_df, op(mixed_df))
    (row,) = tracer.summary()
    assert row["op"] == "char_count_filter"
    assert row["dropped"] == row["before"] - row["after"]
