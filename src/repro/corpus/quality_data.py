"""Training corpora for the three quality classifiers (App. B.1, Table 6).

Synthetic substitutes for the paper's classifier training sets:

* **gpt3**    — positives: Wikipedia/Books/OpenWebText2-like clean prose;
  negatives: CommonCrawl-like text that is mostly junk with a small
  clean-web admixture (real CommonCrawl is overwhelmingly junk — that is
  why GPT-3's keeping ratios in Table 5 are single-digit percent).
* **chinese** — positives: clean pseudo-Chinese (CJK) prose; negatives:
  noisy CJK mixed with latin gibberish and degenerate shorts.
* **code**    — positives/negatives split by a ``max_stars_count``
  threshold that correlates only *weakly* with textual quality — by
  construction, reproducing the paper's observation that the star-based
  labelling makes the Code classifier much worse (F1 61.6% vs ~98%).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import schema
from repro.corpus.text_gen import (
    BOILERPLATE_LINES,
    FLAGGED_SNIPPET,
    Profile,
    _cjk_sentence,
    _domain_vocab,
    _gibberish,
    clean_sentence,
    make_document,
)


def _junk_doc(rng: np.random.Generator) -> str:
    """A junk-*dominant* CommonCrawl document: mostly boilerplate,
    gibberish, link lists and repetition, with at most a stray clean
    sentence — what the bulk of raw CommonCrawl actually looks like,
    and why GPT-3's keeping ratio is low single digits (Table 5)."""
    words, probs = _domain_vocab("web")
    lines = []
    for _ in range(int(rng.integers(4, 12))):
        r = rng.random()
        if r < 0.3:
            lines.append(str(rng.choice(BOILERPLATE_LINES)))
        elif r < 0.55:
            lines.append(" ".join(
                _gibberish(rng, int(rng.integers(3, 12)))
                for _ in range(int(rng.integers(3, 10)))
            ))
        elif r < 0.7:
            word = str(rng.choice(["sale", "win", "free", "now"]))
            lines.append((word + " ") * int(rng.integers(8, 25)))
        elif r < 0.8:
            lines.append(
                f"<a href=http://sp.example/{int(rng.integers(1e6))}>"
                f"{_gibberish(rng, 6)}</a> " + FLAGGED_SNIPPET
            )
        elif r < 0.9:
            lines.append(clean_sentence(rng, words, probs, int(rng.integers(4, 9))))
        else:
            lines.append(_gibberish(rng, int(rng.integers(1, 5))))
    return "\n".join(lines)


def _to_df(spark: SparkSession, texts: list[str], metas: list[dict] | None = None) -> DataFrame:
    metas = metas or [{}] * len(texts)
    pdf = pd.DataFrame({
        "text": texts,
        "meta": [{k: str(v) for k, v in m.items()} for m in metas],
        "stats": [{} for _ in texts],
    })
    return spark.createDataFrame(pdf, schema.DJ_SCHEMA)


def gpt3_training_data(spark: SparkSession, n_per_class: int = 1500,
                       seed: int = 11) -> tuple[DataFrame, DataFrame]:
    """(positive, negative) for the GPT-3 classifier."""
    rng = np.random.default_rng(seed)
    pos_profiles = [
        Profile("wiki", mean_doc_tokens=150),
        Profile("books", mean_doc_tokens=180),
        Profile("web", mean_doc_tokens=140),  # OpenWebText2: curated web
    ]
    pos = [make_document(rng, pos_profiles[i % 3]) for i in range(n_per_class)]
    # CommonCrawl negatives: overwhelmingly junk-dominant documents,
    # with a thin decent-web admixture (label noise that keeps recall
    # below 100%, as in Table 4).
    okay = Profile("web", mean_doc_tokens=140, noise_rate=0.10, html_rate=0.1)
    neg = [
        _junk_doc(rng) if rng.random() < 0.95 else make_document(rng, okay)
        for _ in range(n_per_class)
    ]
    return _to_df(spark, pos), _to_df(spark, neg)


def chinese_training_data(spark: SparkSession, n_per_class: int = 1200,
                          seed: int = 12) -> tuple[DataFrame, DataFrame]:
    """(positive, negative) for the Chinese classifier."""
    rng = np.random.default_rng(seed)
    pos = [
        "\n".join(_cjk_sentence(rng, int(rng.integers(12, 30)))
                  for _ in range(int(rng.integers(3, 8))))
        for _ in range(n_per_class)
    ]
    neg = []
    for _ in range(n_per_class):
        r = rng.random()
        if r < 0.4:  # CJK + latin gibberish soup
            neg.append(
                _cjk_sentence(rng, 8) + " " +
                " ".join(_gibberish(rng, int(rng.integers(4, 12))) for _ in range(8))
                + " " + _cjk_sentence(rng, 6)
            )
        elif r < 0.7:  # degenerate repetition
            ch = chr(0x4E00 + int(rng.integers(0, 100)))
            neg.append(ch * int(rng.integers(30, 120)))
        else:  # very short fragments
            neg.append(_cjk_sentence(rng, int(rng.integers(1, 4))))
    return _to_df(spark, pos), _to_df(spark, neg)


_CODE_KEYWORDS = ["def", "return", "import", "class", "if", "else", "for",
                  "while", "try", "except", "print", "self", "lambda"]


def _code_doc(rng: np.random.Generator, quality: float) -> str:
    """A synthetic source file whose *textual* quality (comment density,
    naming, structure) follows ``quality`` ∈ [0, 1]."""
    n_lines = int(rng.integers(10, 40))
    lines = []
    for _ in range(n_lines):
        if rng.random() < 0.25 * quality:
            lines.append("# " + " ".join(
                str(rng.choice(["compute", "the", "value", "for", "input",
                                "handles", "edge", "cases", "returns", "result"]))
                for _ in range(int(rng.integers(3, 8)))
            ))
        name_len = int(3 + quality * 8 + rng.integers(0, 3))
        name = "".join(rng.choice(list("abcdefghijklmnop"), size=max(1, name_len)))
        kw = str(rng.choice(_CODE_KEYWORDS))
        if rng.random() < 0.6:
            lines.append(f"{kw} {name}({name[:2]}):")
            lines.append(f"    return {name[:3]} + {int(rng.integers(0, 99))}")
        else:
            lines.append(f"{name} = {name[:2]}.{str(rng.choice(['get','run','map']))}()")
        if rng.random() < 0.3 * (1 - quality):
            lines.append(_gibberish(rng, int(rng.integers(20, 80))))
    return "\n".join(lines)


def code_training_data(spark: SparkSession, n_per_class: int = 1200, seed: int = 13,
                       star_quality_correlation: float = 0.35,
                       ) -> tuple[DataFrame, DataFrame]:
    """(positive, negative) for the Code classifier.

    stars = correlation·quality + (1−correlation)·noise, thresholded at
    the 1372-star-like quantile: the label is only weakly predictable
    from the text, which is precisely the paper's diagnosis for the poor
    Code-classifier F1.
    """
    rng = np.random.default_rng(seed)
    n = n_per_class * 2
    quality = rng.random(n)
    stars_score = (star_quality_correlation * quality
                   + (1 - star_quality_correlation) * rng.random(n))
    thr = float(np.median(stars_score))
    docs = [_code_doc(rng, float(q)) for q in quality]
    pos = [d for d, s in zip(docs, stars_score) if s >= thr][:n_per_class]
    neg = [d for d, s in zip(docs, stars_score) if s < thr][:n_per_class]
    return _to_df(spark, pos), _to_df(spark, neg)


def commoncrawl_for_scoring(spark: SparkSession, n_docs: int = 4000,
                            seed: int = 14) -> DataFrame:
    """A CommonCrawl-like sample to re-score for Table 5's keeping
    ratios: overwhelmingly junk with a thin clean tail, so the keeping
    ratio lands in the low single digits like the paper's."""
    rng = np.random.default_rng(seed)
    wiki_like = Profile("wiki", mean_doc_tokens=150)
    borderline = Profile("web", mean_doc_tokens=120, noise_rate=0.5, html_rate=0.4,
                         flagged_rate=0.15, short_rate=0.15)
    docs = []
    for _ in range(n_docs):
        r = rng.random()
        if r < 0.03:          # the thin genuinely-good tail
            docs.append(make_document(rng, wiki_like))
        elif r < 0.08:        # borderline pages the pareto rule gambles on
            docs.append(make_document(rng, borderline))
        else:                 # the junk bulk
            docs.append(_junk_doc(rng))
    return _to_df(spark, docs)
