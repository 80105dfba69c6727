"""Sentencepiece-lite tokenizer and token counting.

Replaces the SentencePiece tokenizer (GPT-NeoX-20B flavour) the paper
uses to count tokens for Table 7: lowercased words with punctuation
split off as separate tokens, and CJK characters tokenized per
character (the property of byte-level BPE that matters for our Chinese
corpus substitute). Implemented as Catalyst expressions; counts are
plain DataFrame aggregates.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core import schema

_PUNCT = r"([.,;:!?()\[\]{}\"”“'`$%&*+=<>/\\|#@^~_-])"


def tokenize_expr(text: Column) -> Column:
    """Array-of-tokens expression: punctuation split off, CJK chars
    isolated, lowercased, empties dropped."""
    spaced = F.regexp_replace(text, _PUNCT, r" $1 ")
    spaced = F.regexp_replace(spaced, r"([一-鿿])", r" $1 ")
    return F.filter(F.split(F.lower(spaced), r"\s+"), lambda t: t != "")


def token_count_expr(text: Column) -> Column:
    """Per-sample token count expression."""
    return F.size(tokenize_expr(text))


def count_tokens(df: DataFrame) -> int:
    """Total token count of a unified dataset."""
    return int(
        df.agg(F.sum(token_count_expr(F.col(schema.TEXT_COL)))).collect()[0][0] or 0
    )


def with_token_counts(df: DataFrame) -> DataFrame:
    """Attach ``stats['token_count']`` per sample."""
    return schema.with_stats(
        df, {"token_count": token_count_expr(F.col(schema.TEXT_COL))}
    )
