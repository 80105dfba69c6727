"""Synthetic heterogeneous corpora — substrate replacing the paper's
RedPajama / Pile / CommonCrawl / Alpaca-CoT raw data (see DESIGN.md
substitution table)."""
