"""Proxy-LLM substrate: bigram language model, synthetic HELM-like
benchmark, and token-budgeted training (see DESIGN.md substitutions)."""
