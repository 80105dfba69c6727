"""Post-tuning evaluation substrate: retrieval responder + pairwise
judge (substitutes GPT-4 API scoring of Table 3 — see DESIGN.md)."""
