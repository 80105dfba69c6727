"""Synthetic text generation with controllable pathologies.

The OPs in this repo act on *textual pathologies* — noise characters,
boilerplate, HTML remnants, flagged words, duplicates, degenerate
lengths. These generators produce English-like prose per *domain*
(web, wiki, books, code, latex, medical, legal, dialog, ...) from
Zipf-sampled vocabularies and inject each pathology at a configurable
rate, so every filter/mapper/dedup exercises the same decision surface
as on real corpora, deterministically in ``seed``.

Vocabulary design: all domains share a common core (stopwords +
frequent content words, Zipf-weighted) and add domain-specific terms.
The downstream proxy-LLM evaluation (``repro.llm``) depends on exactly
this structure: clean in-domain text is predictable for a model trained
on clean same-domain text; noise tokens and duplicates dilute or skew a
trained model's probability mass.
"""
from __future__ import annotations

import string
from dataclasses import dataclass, field, replace

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import schema
from repro.ops._resources import EN_STOPWORDS, _COMMON_CONTENT_WORDS

# ---------------------------------------------------------------------------
# Vocabularies
# ---------------------------------------------------------------------------

_CORE = list(dict.fromkeys(EN_STOPWORDS + _COMMON_CONTENT_WORDS))

DOMAIN_WORDS: dict[str, list[str]] = {
    "web": "online website click free best review price shop offer news blog post share email buy deal store market".split(),
    "wiki": "history century city country population known early later named german french king empire war university science".split(),
    "books": "night morning heart eyes voice door room window house light dark street love thought remember silence dream".split(),
    "code": "def return import class function value string print result data list index error type object module self".split(),
    "latex": "theorem lemma proof equation matrix vector function gradient bound convergence distribution estimator model parameter".split(),
    "medical": "patients treatment clinical study disease cells protein cancer therapy dose trial symptoms diagnosis gene expression".split(),
    "legal": "court plaintiff defendant judgment statute appeal motion evidence counsel jurisdiction pursuant filed district order claim".split(),
    "dialog": "question answer thanks please help problem works tried using issue error solution example check post reply".split(),
    "patents": "invention apparatus embodiment claim method device comprising wherein configured surface layer portion assembly signal".split(),
    "parliament": "member president commission council parliament proposal amendment directive states policy union debate vote report".split(),
    "philosophy": "argument premise conclusion moral knowledge belief truth mind consciousness reason ethical theory claim principle".split(),
    "grants": "research project aim funding proposal investigator study develop analysis methods training program health national".split(),
    "instruction": "write explain describe list summarize translate generate create identify compare answer given following provide steps".split(),
}

BOILERPLATE_LINES = [
    "click here to subscribe to our newsletter now",
    "accept all cookies to continue reading this page",
    "all rights reserved copyright 2023 terms of service",
    "sign up free trial limited offer buy now",
    "follow us on social media like and share",
]

FLAGGED_SNIPPET = "flaggedterm spam casino jackpot"


def _domain_vocab(domain: str) -> tuple[list[str], np.ndarray]:
    """(words, probs): shared core + domain words, Zipf-weighted with the
    domain words boosted so domains are distinguishable."""
    words = _CORE + DOMAIN_WORDS[domain]
    ranks = np.arange(1, len(words) + 1, dtype=float)
    probs = 1.0 / ranks
    # Boost domain terms well into the frequent zone: domains must be
    # distinguishable enough that a single-domain corpus (RefinedWeb)
    # pays a real perplexity price on out-of-domain eval tasks — the
    # "domain coverage" mechanism behind Table 2's DJ-vs-Falcon gap.
    probs[len(_CORE):] *= 30.0
    return words, probs / probs.sum()


def _gibberish(rng: np.random.Generator, n: int) -> str:
    chars = np.array(list(string.ascii_letters + string.digits + "§±¤¢¶•◆"))
    return "".join(rng.choice(chars, size=n))


# ---------------------------------------------------------------------------
# Document profiles
# ---------------------------------------------------------------------------


@dataclass(frozen=True)
class Profile:
    """Pathology rates for one corpus component (all rates in [0, 1])."""

    domain: str = "web"
    language: str = "EN"
    mean_doc_tokens: int = 180
    noise_rate: float = 0.0       # docs with gibberish/boilerplate/html
    dup_rate: float = 0.0         # docs that are (near-)copies of others
    flagged_rate: float = 0.0     # docs containing flagged words
    short_rate: float = 0.0       # degenerate very-short docs
    latex_rate: float = 0.0       # docs wrapped with LaTeX preamble/bib
    html_rate: float = 0.0        # docs with html tags/urls
    cjk: bool = False             # pseudo-Chinese (CJK chars) text


def clean_sentence(rng: np.random.Generator, words: list[str], probs: np.ndarray,
                   n_words: int) -> str:
    toks = rng.choice(words, size=max(n_words, 3), p=probs)
    s = " ".join(toks)
    return s[0].upper() + s[1:] + "."


def _cjk_sentence(rng: np.random.Generator, n: int) -> str:
    # Pseudo-Chinese: Zipf-sampled CJK codepoints, no spaces, 。-ended.
    base = 0x4E00
    ranks = np.arange(1, 1201, dtype=float)
    probs = (1.0 / ranks) / (1.0 / ranks).sum()
    chars = [chr(base + int(i)) for i in rng.choice(1200, size=n, p=probs)]
    return "".join(chars) + "。"


def make_document(rng: np.random.Generator, prof: Profile) -> str:
    """One document honouring the profile's pathology draws."""
    if rng.random() < prof.short_rate:
        return " ".join(rng.choice(_CORE, size=int(rng.integers(1, 4))))
    n_tokens = max(12, int(rng.normal(prof.mean_doc_tokens, prof.mean_doc_tokens * 0.3)))
    if prof.cjk:
        n_sent = max(1, n_tokens // 20)
        body = "\n".join(_cjk_sentence(rng, int(rng.integers(10, 30))) for _ in range(n_sent))
        return body
    words, probs = _domain_vocab(prof.domain)
    sentences, used = [], 0
    while used < n_tokens:
        n = int(rng.integers(6, 18))
        sentences.append(clean_sentence(rng, words, probs, n))
        used += n
    # Group into paragraphs of ~4 sentences.
    paras = [
        " ".join(sentences[i:i + 4]) for i in range(0, len(sentences), 4)
    ]
    doc = "\n\n".join(paras)
    if rng.random() < prof.noise_rate:
        doc = _inject_noise(rng, doc)
    if rng.random() < prof.html_rate:
        doc = (
            f'<div class="content"><p>{doc}</p></div>\n'
            f"visit http://track.example.com/?id={int(rng.integers(1e6))} "
            f"contact admin@example.com"
        )
    if rng.random() < prof.flagged_rate:
        doc = doc + "\n" + FLAGGED_SNIPPET
    if rng.random() < prof.latex_rate:
        doc = (
            "\\documentclass{article}\n\\usepackage{amsmath}\n"
            "% reviewer comment to strip\n"
            "\\newcommand{\\eg}{for example}\n"
            "\\section{Introduction}\n" + doc +
            "\n\\begin{thebibliography}{9}\n\\bibitem{x} Some Ref.\n"
            "\\end{thebibliography}"
        )
    return doc


def _inject_noise(rng: np.random.Generator, doc: str) -> str:
    kind = rng.random()
    if kind < 0.4:  # boilerplate lines interleaved
        lines = doc.split("\n")
        for _ in range(int(rng.integers(1, 4))):
            pos = int(rng.integers(0, len(lines) + 1))
            lines.insert(pos, str(rng.choice(BOILERPLATE_LINES)))
        return "\n".join(lines)
    if kind < 0.7:  # gibberish runs
        return doc + "\n" + " ".join(
            _gibberish(rng, int(rng.integers(5, 60))) for _ in range(int(rng.integers(2, 6)))
        )
    # degenerate repetition
    word = str(rng.choice(["buy", "now", "win", "free"]))
    return doc + "\n" + (word + " ") * int(rng.integers(30, 80)) + "!" * 40


def generate_component(
    spark: SparkSession,
    name: str,
    target_tokens: int,
    profile: Profile,
    seed: int,
) -> DataFrame:
    """A unified dataset for one corpus component of ~``target_tokens``
    whitespace tokens, with ``meta`` = {component, language, domain}.

    Duplicates are injected *after* generation: ``dup_rate`` of the docs
    are replaced by exact or lightly-perturbed copies of earlier docs.
    """
    rng = np.random.default_rng(seed)
    docs: list[str] = []
    used = 0
    while used < target_tokens:
        doc = make_document(rng, profile)
        docs.append(doc)
        used += len(doc.split())
    n = len(docs)
    n_dups = int(n * profile.dup_rate)
    for _ in range(n_dups):
        victim = int(rng.integers(0, n))
        source = int(rng.integers(0, n))
        if victim == source:
            continue
        base = docs[source]
        if rng.random() < 0.5:
            docs[victim] = base  # exact duplicate
        else:  # near duplicate: tweak punctuation / append a word
            docs[victim] = base.replace(".", "!", 1) + " indeed."
    pdf = pd.DataFrame(
        {
            "text": docs,
            "meta": [
                {
                    "component": name,
                    "language": profile.language,
                    "domain": profile.domain,
                }
            ]
            * len(docs),
            "stats": [{} for _ in docs],
        }
    )
    return spark.createDataFrame(pdf, schema.DJ_SCHEMA)


def clean_eval_texts(domain: str, n_docs: int, seed: int,
                     mean_tokens: int = 120) -> list[str]:
    """Pristine in-domain documents for proxy-LLM evaluation tasks."""
    rng = np.random.default_rng(seed)
    prof = Profile(domain=domain, mean_doc_tokens=mean_tokens)
    return [make_document(rng, prof) for _ in range(n_docs)]
