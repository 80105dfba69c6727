"""Filter OPs — conditional sample removal (paper Sec. 4.2, Table 1).

Every filter follows the decoupled ``compute_stats`` / ``process``
protocol from paper Appendix A.1: ``stats_exprs`` produces named stat
expressions (reused by the Analyzer over the *whole* dataset and merged
by OP fusion into a single projection), ``predicate`` consumes
``stats[...]`` entries. Filters that tokenize declare shared contexts
(``words`` / ``lines`` / ``sentences``) so fusion computes each context
once per sample (the paper's context manager).
"""
from __future__ import annotations

import math
from typing import Mapping

import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.base import Filter
from repro.core.registry import register
from repro.ops._resources import (
    COMMON_WORD_LOGPROB,
    EN_STOPWORDS,
    FLAGGED_WORDS,
    OOV_LOGPROB,
)


def _ratio(num: Column, den: Column) -> Column:
    """num/den with 0-denominator guarded to 0.0."""
    return F.when(den > 0, num.cast("double") / den.cast("double")).otherwise(F.lit(0.0))


class RangeFilter(Filter):
    """Base for filters that keep ``min_val <= stats[key] <= max_val``."""

    stat_key: str = ""

    def __init__(self, min_val: float = 0.0, max_val: float = float("inf")):
        self.min_val = float(min_val)
        self.max_val = float(max_val)

    def predicate_for(self, exprs) -> Column:
        s = exprs.get(self.stat_key) if exprs else None
        if s is None:
            s = schema.stat(self.stat_key)
        s = s.cast("double")
        return (s >= F.lit(self.min_val)) & (s <= F.lit(self.max_val))


# ---------------------------------------------------------------------------
# Character-level filters (no shared context)
# ---------------------------------------------------------------------------


@register("char_count_filter")
class CharCountFilter(RangeFilter):
    """Keep samples whose character count lies in [min_val, max_val]."""

    stat_key = "char_count"
    selectivity = 0.85

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        return {self.stat_key: F.length(text)}


@register("alnum_ratio_filter")
class AlnumRatioFilter(RangeFilter):
    """Keep samples with alphanumeric-character ratio in range (noise gate)."""

    stat_key = "alnum_ratio"
    selectivity = 0.8

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        alnum = F.length(F.regexp_replace(text, r"[^0-9A-Za-z]", ""))
        return {self.stat_key: _ratio(alnum, F.length(text))}


@register("alpha_ratio_filter")
class AlphaRatioFilter(RangeFilter):
    """Keep samples with alphabetic-character ratio in range."""

    stat_key = "alpha_ratio"

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        alpha = F.length(F.regexp_replace(text, r"[^A-Za-z]", ""))
        return {self.stat_key: _ratio(alpha, F.length(text))}


@register("digit_ratio_filter")
class DigitRatioFilter(RangeFilter):
    """Keep samples whose digit ratio is in range (tables/logs gate)."""

    stat_key = "digit_ratio"

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        digits = F.length(F.regexp_replace(text, r"[^0-9]", ""))
        return {self.stat_key: _ratio(digits, F.length(text))}


@register("special_char_ratio_filter")
class SpecialCharRatioFilter(RangeFilter):
    """Keep samples whose special-character ratio is in range."""

    stat_key = "special_char_ratio"
    selectivity = 0.8

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        special = F.length(F.regexp_replace(text, r"[0-9A-Za-z\s]", ""))
        return {self.stat_key: _ratio(special, F.length(text))}


@register("whitespace_ratio_filter")
class WhitespaceRatioFilter(RangeFilter):
    """Keep samples whose whitespace ratio is in range."""

    stat_key = "whitespace_ratio"

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        ws = F.length(F.regexp_replace(text, r"[^\s]", ""))
        return {self.stat_key: _ratio(ws, F.length(text))}


@register("char_repetition_filter")
class CharRepetitionFilter(RangeFilter):
    """Keep samples whose character-diversity deficit is below max_val.

    stat = 1 - distinct_chars / chars: near 1.0 for degenerate
    aaaaaa…-style texts (the char-ngram repetition gate of the paper,
    computed with a closed-form proxy that stays in Catalyst).
    """

    stat_key = "char_rep_ratio"

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        distinct = F.size(F.array_distinct(F.split(text, "")))
        return {
            self.stat_key: F.lit(1.0) - _ratio(distinct, F.greatest(F.length(text), F.lit(1)))
        }


# ---------------------------------------------------------------------------
# Word-context filters (share the "words" context)
# ---------------------------------------------------------------------------


@register("word_count_filter")
class WordCountFilter(RangeFilter):
    """Keep samples whose word count is in range."""

    stat_key = "word_count"
    context_keys = ("words",)
    selectivity = 0.85

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        return {self.stat_key: F.size(ctx["words"])}


@register("avg_word_length_filter")
class AvgWordLengthFilter(RangeFilter):
    """Keep samples whose mean word length is in range."""

    stat_key = "avg_word_len"
    context_keys = ("words",)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        words = ctx["words"]
        total = F.aggregate(
            words, F.lit(0).cast("double"), lambda acc, w: acc + F.length(w)
        )
        return {self.stat_key: _ratio(total, F.size(words))}


@register("stopword_ratio_filter", tags=("en",))
class StopwordRatioFilter(RangeFilter):
    """Keep samples with *at least* min_val stopword ratio.

    Natural language has a high closed-class word ratio; gibberish,
    tables and code do not — a classic C4/Gopher quality rule.
    """

    stat_key = "stopword_ratio"
    context_keys = ("words",)
    selectivity = 0.8

    def __init__(self, min_val: float = 0.0, max_val: float = 1.0,
                 stopwords: tuple[str, ...] = EN_STOPWORDS):
        super().__init__(min_val, max_val)
        self.stopwords = tuple(stopwords)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        words = ctx["words"]
        # isin over >10 literals compiles to Catalyst InSet (hash set),
        # O(1) per word vs O(|stopwords|) for an array_contains scan.
        hits = F.size(F.filter(words, lambda w: w.isin(*self.stopwords)))
        return {self.stat_key: _ratio(hits, F.size(words))}


@register("flagged_words_filter", tags=("en",))
class FlaggedWordsFilter(RangeFilter):
    """Keep samples whose flagged-word ratio is at most max_val."""

    stat_key = "flagged_ratio"
    context_keys = ("words",)
    selectivity = 0.95

    def __init__(self, max_val: float = 0.01,
                 flagged: tuple[str, ...] = FLAGGED_WORDS):
        super().__init__(0.0, max_val)
        self.flagged = tuple(flagged)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        words = ctx["words"]
        hits = F.size(F.filter(words, lambda w: w.isin(*self.flagged)))
        return {self.stat_key: _ratio(hits, F.size(words))}


@register("language_score_filter", tags=("en",))
class LanguageScoreFilter(RangeFilter):
    """Keep samples whose English-ness score is at least min_val.

    Substitutes the fastText language-id model (offline): score =
    0.5·ascii-letter ratio + 0.5·stopword hit rate, which separates
    English prose from CJK/garbage exactly as needed by our corpora.
    """

    stat_key = "lang_score"
    context_keys = ("words",)
    selectivity = 0.9
    cost = 2.0

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        words = ctx["words"]
        ascii_alpha = F.length(F.regexp_replace(text, r"[^A-Za-z ]", ""))
        hits = F.size(F.filter(words, lambda w: w.isin(*EN_STOPWORDS)))
        return {
            self.stat_key: 0.5 * _ratio(ascii_alpha, F.length(text))
            + 0.5 * _ratio(hits, F.size(words))
        }


@register("perplexity_filter", tags=("en",))
class PerplexityFilter(RangeFilter):
    """Keep samples whose pseudo-perplexity is at most max_val.

    Substitutes the KenLM 5-gram with a built-in Zipf unigram table:
    ppl = exp(−mean log p(word)), OOV floored. Fluent English with many
    frequent words scores low; gibberish scores near exp(−log 1e-6)≈1e6.
    """

    stat_key = "perplexity"
    context_keys = ("words",)
    cost = 3.0
    selectivity = 0.85

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        words = ctx["words"]
        entries = [
            x
            for w, lp in COMMON_WORD_LOGPROB.items()
            for x in (F.lit(w), F.lit(lp))
        ]
        table = F.create_map(*entries)
        total_lp = F.aggregate(
            words,
            F.lit(0.0),
            lambda acc, w: acc
            + F.coalesce(table[F.regexp_replace(w, r"[^a-z']", "")], F.lit(OOV_LOGPROB)),
        )
        mean_lp = _ratio(total_lp, F.size(words))
        return {self.stat_key: F.exp(-mean_lp)}


@register("word_repetition_filter")
class WordRepetitionFilter(RangeFilter):
    """Keep samples whose word-repetition ratio is at most max_val.

    Proxy for the paper's word-level n-gram repetition gate: the
    type–token deficit ``1 − distinct_words/words``, linear-time in
    Catalyst (an O(n²) top-word count was measurably the hottest OP in
    the refine recipe). Normal prose sits around 0.3–0.6; spam
    ("buy buy buy …") approaches 1.
    """

    stat_key = "word_rep_ratio"
    context_keys = ("words",)
    cost = 2.0

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        words = ctx["words"]
        return {
            self.stat_key: F.when(F.size(words) == 0, F.lit(0.0)).otherwise(
                F.lit(1.0) - _ratio(F.size(F.array_distinct(words)), F.size(words))
            )
        }


@register("token_count_filter")
class TokenCountFilter(RangeFilter):
    """Keep samples whose approximate token count is in range.

    Tokens ≈ words + standalone punctuation marks (the sentencepiece-lite
    tokenizer of :mod:`repro.corpus.tokenizer` agrees on prose).
    """

    stat_key = "token_count"
    context_keys = ("words",)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        punct = F.length(F.regexp_replace(text, r"[^.,;:!?]", ""))
        return {self.stat_key: F.size(ctx["words"]) + punct}


# ---------------------------------------------------------------------------
# Line / sentence / paragraph filters
# ---------------------------------------------------------------------------


@register("line_count_filter")
class LineCountFilter(RangeFilter):
    """Keep samples whose line count is in range."""

    stat_key = "line_count"
    context_keys = ("lines",)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        return {self.stat_key: F.size(ctx["lines"])}


@register("max_line_length_filter")
class MaxLineLengthFilter(RangeFilter):
    """Keep samples whose longest line is within range (minified-code gate)."""

    stat_key = "max_line_len"
    context_keys = ("lines",)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        return {
            self.stat_key: F.coalesce(
                F.array_max(F.transform(ctx["lines"], F.length)), F.lit(0)
            )
        }


@register("avg_line_length_filter")
class AvgLineLengthFilter(RangeFilter):
    """Keep samples whose mean line length is in range."""

    stat_key = "avg_line_len"
    context_keys = ("lines",)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        lines = ctx["lines"]
        total = F.aggregate(lines, F.lit(0.0), lambda acc, ln: acc + F.length(ln))
        return {self.stat_key: _ratio(total, F.size(lines))}


@register("paragraph_count_filter")
class ParagraphCountFilter(RangeFilter):
    """Keep samples whose blank-line-separated paragraph count is in range."""

    stat_key = "paragraph_count"

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        paras = F.filter(F.split(text, r"\n{2,}"), lambda p: F.trim(p) != "")
        return {self.stat_key: F.size(paras)}


@register("sentence_count_filter")
class SentenceCountFilter(RangeFilter):
    """Keep samples whose sentence count is in range."""

    stat_key = "sentence_count"
    context_keys = ("sentences",)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        return {self.stat_key: F.size(ctx["sentences"])}


# ---------------------------------------------------------------------------
# Python-side / meta / model-score filters
# ---------------------------------------------------------------------------


@register("text_entropy_filter")
class TextEntropyFilter(RangeFilter):
    """Keep samples whose Shannon character entropy (bits) is in range.

    Needs per-document frequency tables → pandas UDF (high `cost`, so
    the reordering optimizer schedules it late).
    """

    stat_key = "char_entropy"
    cost = 6.0

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        @F.pandas_udf("double")
        def _entropy(s: pd.Series) -> pd.Series:
            def one(x: str) -> float:
                if not x:
                    return 0.0
                n = len(x)
                counts: dict[str, int] = {}
                for ch in x:
                    counts[ch] = counts.get(ch, 0) + 1
                return -sum((c / n) * math.log2(c / n) for c in counts.values())

            return s.map(one)

        return {self.stat_key: _entropy(text)}


@register("meta_field_filter")
class MetaFieldFilter(Filter):
    """Keep samples whose ``meta[key]`` is among ``values``.

    This is the meta-tag filter of the paper's HPO data-mixing example
    (step 2: keep only samples with language tag "EN").
    """

    selectivity = 0.7

    def __init__(self, key: str = "language", values: tuple[str, ...] = ("EN",)):
        self.key = key
        self.values = tuple(values)

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        return {}

    def compute_stats(self, df: DataFrame) -> DataFrame:
        return df

    def predicate(self) -> Column:
        return schema.meta(self.key).isin(list(self.values))


@register("quality_score_filter")
class QualityScoreFilter(RangeFilter):
    """Keep samples whose model quality score (``stats['quality_score']``)
    is at least min_val. The score is produced upstream by the quality
    classifier tool (Sec. 6.2); this OP is pure predicate."""

    stat_key = "quality_score"

    def stats_exprs(self, text: Column, ctx: Mapping[str, Column]) -> dict[str, Column]:
        return {}

    def compute_stats(self, df: DataFrame) -> DataFrame:
        return df

    def predicate(self) -> Column:
        s = F.coalesce(schema.stat(self.stat_key), F.lit(0.0))
        return (s >= F.lit(self.min_val)) & (s <= F.lit(self.max_val))
