"""Built-in lexical resources for Filter OPs.

The real system downloads stopword/flagged-word lists and a KenLM
perplexity model from a public drive; offline, we embed compact
equivalents: a standard English stopword list, a flagged-word list
(mild words plus the synthetic marker our corpus generators inject),
and a unigram log-probability table over frequent English words that
powers a cheap pseudo-perplexity (substituting the KenLM 5-gram —
documented in DESIGN.md).
"""
from __future__ import annotations

import math

EN_STOPWORDS: tuple[str, ...] = (
    "the", "a", "an", "and", "or", "but", "if", "then", "of", "to", "in",
    "on", "at", "by", "for", "with", "about", "as", "is", "are", "was",
    "were", "be", "been", "being", "it", "its", "this", "that", "these",
    "those", "he", "she", "they", "we", "you", "i", "his", "her", "their",
    "our", "your", "my", "not", "no", "do", "does", "did", "have", "has",
    "had", "will", "would", "can", "could", "should", "from", "there",
    "what", "which", "who", "when", "where", "how", "all", "any", "some",
    "more", "most", "other", "into", "over", "after", "before", "between",
    "out", "up", "down", "so", "than", "too", "very", "just", "only",
)

#: Words whose presence marks low-quality / unsafe text. The corpus
#: generators inject "flaggedterm" as the synthetic toxic marker.
FLAGGED_WORDS: tuple[str, ...] = (
    "flaggedterm", "damn", "hell", "crap", "stupid", "idiot", "hate",
    "kill", "spam", "viagra", "casino", "jackpot", "xxx",
)

# Zipf-ish unigram probabilities over frequent words: rank r in the
# merged (stopwords + content words) list gets p(r) ∝ 1/r, normalized
# over the top ~10k-word "vocabulary" (mass outside the table falls to
# the OOV floor used by the perplexity filter).
_COMMON_CONTENT_WORDS: tuple[str, ...] = (
    "time", "people", "year", "way", "day", "man", "world", "life",
    "hand", "part", "child", "eye", "woman", "place", "work", "week",
    "case", "point", "government", "company", "number", "group",
    "problem", "fact", "new", "good", "high", "old", "great", "big",
    "small", "large", "long", "little", "own", "right", "different",
    "important", "public", "same", "able", "get", "make", "go", "know",
    "take", "see", "come", "think", "look", "want", "give", "use",
    "find", "tell", "ask", "seem", "feel", "try", "leave", "call",
    "said", "say", "one", "two", "three", "first", "last", "also",
    "because", "through", "during", "without", "again", "against",
    "while", "such", "each", "many", "much", "both", "few", "those",
)


def _build_logprob() -> dict[str, float]:
    words = list(dict.fromkeys(EN_STOPWORDS + _COMMON_CONTENT_WORDS))
    harmonic = sum(1.0 / r for r in range(1, 10_001))
    return {
        w: math.log((1.0 / (r + 1)) / harmonic) for r, w in enumerate(words)
    }


#: word -> log p(word) under a Zipf unigram model of frequent English.
COMMON_WORD_LOGPROB: dict[str, float] = _build_logprob()

#: log-probability assigned to out-of-table words.
OOV_LOGPROB: float = math.log(1e-6)
