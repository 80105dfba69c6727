"""Token-budgeted "pre-training" and IFT continuation (paper Sec. 8.1).

``pretrain`` samples a corpus down to a token budget (the 150B/300B/350B
knobs of Table 2, scaled) and fits the bigram proxy;
``continue_with`` mimics continued pre-training on IFT data by training
on the union of the (budgeted) base corpus and the extra corpus —
exact for a count-based model, since counts are additive.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.llm.bigram import BigramModel, sample_to_token_budget, train


def pretrain(corpus: DataFrame, token_budget: int, seed: int = 0, k: float = 0.05) -> BigramModel:
    """Train the proxy LM on ``token_budget`` tokens of ``corpus``."""
    return train(sample_to_token_budget(corpus, token_budget, seed), k=k)


def continue_with(base_corpus: DataFrame, base_budget: int, extra: DataFrame,
                  extra_budget: int | None = None, seed: int = 0, k: float = 0.05) -> BigramModel:
    """Continue training: base budgeted corpus ∪ (budgeted) extra corpus."""
    base = sample_to_token_budget(base_corpus, base_budget, seed)
    if extra_budget is not None:
        extra = sample_to_token_budget(extra, extra_budget, seed + 1)
    return train(base.unionByName(extra), k=k)
