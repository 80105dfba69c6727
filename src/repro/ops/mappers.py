"""Mapper OPs — in-place text editing (paper Sec. 4.2, Table 1).

All mappers are Catalyst expressions (``regexp_replace`` & friends) so
pipelines of mappers collapse into a single whole-stage-codegen'd
projection, except :class:`FixUnicodeMapper`, which needs Python's
``unicodedata`` and is implemented as a pandas UDF.
"""
from __future__ import annotations

import unicodedata

import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.base import Mapper
from repro.core.registry import register

# Matches the paper's OP naming convention (snake_case ending in _mapper).


@register("whitespace_normalization_mapper")
class WhitespaceNormalizationMapper(Mapper):
    """Collapse runs of spaces/tabs, strip trailing space, squeeze blank lines."""

    def transform_expr(self, text: Column) -> Column:
        t = F.regexp_replace(text, r"[ \t\x0b\f\r]+", " ")
        t = F.regexp_replace(t, r" ?\n ?", "\n")
        t = F.regexp_replace(t, r"\n{3,}", "\n\n")
        return F.trim(t)


@register("punctuation_normalization_mapper")
class PunctuationNormalizationMapper(Mapper):
    """Map common unicode punctuation to ASCII equivalents."""

    _TABLE = {
        "\u201c": '"', "\u201d": '"', "\u2018": "'", "\u2019": "'",
        "\u2013": "-", "\u2014": "-", "\u2026": "...", "\u00ab": '"',
        "\u00bb": '"', "\u3001": ",", "\u3002": ".", "\uff0c": ",",
        "\uff0e": ".", "\uff1f": "?", "\uff01": "!",
    }

    def transform_expr(self, text: Column) -> Column:
        src = "".join(self._TABLE)
        # Multi-char replacements (ellipsis) need regexp; single chars translate.
        t = F.regexp_replace(text, "\u2026", "...")
        singles = {k: v for k, v in self._TABLE.items() if len(v) == 1}
        return F.translate(t, "".join(singles), "".join(singles.values())) if singles else t


@register("fix_unicode_mapper")
class FixUnicodeMapper(Mapper):
    """NFKC-normalize text and drop control characters (mojibake repair)."""

    cost = 4.0  # python-side; reordering should not hoist it over cheap filters

    def process(self, df: DataFrame) -> DataFrame:
        @F.pandas_udf("string")
        def _fix(s: pd.Series) -> pd.Series:
            def one(x: str) -> str:
                x = unicodedata.normalize("NFKC", x)
                return "".join(
                    ch for ch in x if ch in "\n\t" or unicodedata.category(ch)[0] != "C"
                )

            return s.map(one)

        return df.withColumn(schema.TEXT_COL, _fix(F.col(schema.TEXT_COL)))


@register("lowercase_mapper")
class LowercaseMapper(Mapper):
    """Lowercase the whole text."""

    def transform_expr(self, text: Column) -> Column:
        return F.lower(text)


@register("clean_html_mapper", tags=("general", "web"))
class CleanHtmlMapper(Mapper):
    """Strip HTML/XML tags and decode a few common entities."""

    def transform_expr(self, text: Column) -> Column:
        t = F.regexp_replace(text, r"<[^>]{0,500}>", " ")
        for ent, rep in [("&nbsp;", " "), ("&amp;", "&"), ("&lt;", "<"),
                         ("&gt;", ">"), ("&quot;", '"'), ("&#39;", "'")]:
            t = F.regexp_replace(t, ent, rep)
        return t


@register("clean_links_mapper", tags=("general", "web"))
class CleanLinksMapper(Mapper):
    """Remove http(s)/ftp URLs and bare www. links."""

    def transform_expr(self, text: Column) -> Column:
        return F.regexp_replace(text, r"(?:https?|ftp)://\S+|www\.\S+", "")


@register("clean_email_mapper", tags=("general", "web"))
class CleanEmailMapper(Mapper):
    """Remove e-mail addresses (anonymization)."""

    def transform_expr(self, text: Column) -> Column:
        return F.regexp_replace(text, r"[A-Za-z0-9.\-+_]+@[A-Za-z0-9.\-]+\.[A-Za-z]{2,}", "")


@register("clean_ip_mapper", tags=("general", "web"))
class CleanIpMapper(Mapper):
    """Remove IPv4 addresses (anonymization)."""

    def transform_expr(self, text: Column) -> Column:
        return F.regexp_replace(text, r"\b(?:\d{1,3}\.){3}\d{1,3}\b", "")


@register("clean_copyright_mapper", tags=("code",))
class CleanCopyrightMapper(Mapper):
    """Drop leading copyright/license comment lines from code files."""

    def transform_expr(self, text: Column) -> Column:
        return F.regexp_replace(
            text, r"(?i)^(?:\s*(?:#|//|\*|/\*)[^\n]*(?:copyright|license|licensed)[^\n]*\n)+", ""
        )


@register("remove_header_mapper", tags=("latex",))
class RemoveHeaderMapper(Mapper):
    """Remove everything before the first LaTeX sectioning command.

    Mirrors the arXiv pre-processing in RedPajama: drop the preamble
    (documentclass, usepackage, title/author block).
    """

    def transform_expr(self, text: Column) -> Column:
        return F.when(
            text.rlike(r"\\(section|chapter)\*?\{"),
            F.regexp_replace(text, r"(?s)^.*?(?=\\(?:section|chapter)\*?\{)", ""),
        ).otherwise(text)


@register("remove_bibliography_mapper", tags=("latex",))
class RemoveBibliographyMapper(Mapper):
    """Truncate at the bibliography / references block (LaTeX sources)."""

    def transform_expr(self, text: Column) -> Column:
        return F.regexp_replace(
            text,
            r"(?s)(\\begin\{thebibliography\}|\\bibliography\{|\\printbibliography).*$",
            "",
        )


@register("remove_comments_mapper", tags=("latex",))
class RemoveCommentsMapper(Mapper):
    """Strip LaTeX ``%`` line comments (not escaped ``\\%``)."""

    def transform_expr(self, text: Column) -> Column:
        t = F.regexp_replace(text, r"(?m)^%[^\n]*\n?", "")
        return F.regexp_replace(t, r"(?<!\\)%[^\n]*", "")


@register("expand_macro_mapper", tags=("latex",))
class ExpandMacroMapper(Mapper):
    """Inline simple zero-argument ``\\newcommand`` macro definitions.

    Handles the common RedPajama-arXiv case: ``\\newcommand{\\x}{body}``
    definitions are removed and later uses of ``\\x`` replaced by body.
    Implemented as a pandas UDF (needs per-document macro tables).
    """

    cost = 4.0
    _DEF = r"\\(?:new|renew)command\*?\{\\(\w+)\}\{([^{}]*)\}"

    def process(self, df: DataFrame) -> DataFrame:
        import re

        pat = re.compile(self._DEF)

        @F.pandas_udf("string")
        def _expand(s: pd.Series) -> pd.Series:
            def one(x: str) -> str:
                macros = dict(pat.findall(x))
                x = pat.sub("", x)
                for name, body in macros.items():
                    x = re.sub(r"\\" + re.escape(name) + r"(?![A-Za-z])", body.replace("\\", "\\\\"), x)
                return x

            return s.map(one)

        return df.withColumn(schema.TEXT_COL, _expand(F.col(schema.TEXT_COL)))


@register("remove_specific_chars_mapper")
class RemoveSpecificCharsMapper(Mapper):
    """Delete a configurable set of characters (default: box-drawing junk)."""

    def __init__(self, chars: str = "◆●■►▼▲▴∆▻▷❖♡□"):
        self.chars = chars

    def transform_expr(self, text: Column) -> Column:
        return F.translate(text, self.chars, "")


@register("remove_long_words_mapper")
class RemoveLongWordsMapper(Mapper):
    """Drop words longer than ``max_len`` characters (URL shards, garbage)."""

    def __init__(self, max_len: int = 40):
        self.max_len = int(max_len)

    def transform_expr(self, text: Column) -> Column:
        # Compact regexes, not an array filter+join: large higher-order
        # expressions get duplicated across downstream projections by
        # Catalyst's CollapseProject and blow up optimizer/runtime cost.
        t = F.regexp_replace(text, rf"(\s|^)\S{{{self.max_len + 1},}}(?=\s|$)", "$1")
        return F.regexp_replace(t, r"[ ]{2,}", " ")


@register("remove_table_text_mapper", tags=("latex", "web"))
class RemoveTableTextMapper(Mapper):
    """Remove lines that look like ASCII tables (many ``|`` separators)."""

    def transform_expr(self, text: Column) -> Column:
        kept = F.filter(
            F.split(text, r"\n"),
            lambda ln: F.length(ln) - F.length(F.regexp_replace(ln, r"\|", "")) < F.lit(3),
        )
        return F.array_join(kept, "\n")


@register("remove_repeat_sentences_mapper")
class RemoveRepeatSentencesMapper(Mapper):
    """Collapse consecutive duplicate lines within a document."""

    def transform_expr(self, text: Column) -> Column:
        # Backreference regex: a run of identical lines collapses to its
        # first occurrence. One small expression — the index-array HOF
        # formulation of the same edit made the Catalyst tree so large
        # that downstream projection-collapse dominated pipeline cost.
        return F.regexp_replace(text, r"(?m)(^.*$)(\n\1(?=\n|$))+", "$1")


@register("sentence_split_mapper", tags=("en",))
class SentenceSplitMapper(Mapper):
    """Re-flow text to one sentence per line (naive EN splitter)."""

    def transform_expr(self, text: Column) -> Column:
        t = F.regexp_replace(text, r"\s*\n\s*", " ")
        return F.regexp_replace(t, r"(?<=[.!?])\s+(?=[A-Z\"'(])", "\n")


@register("truncate_mapper")
class TruncateMapper(Mapper):
    """Hard-truncate text to at most ``max_chars`` characters."""

    def __init__(self, max_chars: int = 20000):
        self.max_chars = int(max_chars)

    def transform_expr(self, text: Column) -> Column:
        return F.substring(text, 1, self.max_chars)
