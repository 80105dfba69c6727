"""Built-in data recipes (paper Sec. 6.1 — ">20 high-quality recipes").

Declarative configs consumed by :mod:`repro.core.config` /
:mod:`repro.core.pipeline`. The ones used by the evaluation harnesses:

* ``PRETRAIN_REFINE``  — the general pre-training refinement recipe
  applied to the RedPajama+Pile merge (Table 2 "Data-Juicer" rows);
* ``BOOKS_RECIPE`` / ``ARXIV_RECIPE`` — the §8.2.1 end-to-end recipes;
* ``FUSION_BENCH_RECIPE`` — the §8.2.2 14-OP recipe (5 Mappers,
  8 Filters, 1 Deduplicator; 5 OPs fusible);
* ``SFT_REFINE`` — the post-tuning refinement recipe of Table 3;
* ``IFT_REFINE`` — the Alpaca-CoT-IFT refinement of Table 2's last row.
"""
from __future__ import annotations

from repro.core.config import Recipe, load_recipe

PRETRAIN_REFINE = load_recipe(
    {
        "name": "pretrain-refine",
        "description": "general pre-training cleanup: strip markup, fix text, "
                       "gate on quality stats, dedup",
        "process": [
            {"clean_html_mapper": {}},
            {"clean_links_mapper": {}},
            {"clean_email_mapper": {}},
            {"whitespace_normalization_mapper": {}},
            {"remove_long_words_mapper": {"max_len": 40}},
            {"char_count_filter": {"min_val": 80}},
            {"word_count_filter": {"min_val": 15}},
            {"alnum_ratio_filter": {"min_val": 0.6}},
            {"special_char_ratio_filter": {"max_val": 0.25}},
            {"stopword_ratio_filter": {"min_val": 0.08}},
            {"flagged_words_filter": {"max_val": 0.01}},
            {"word_repetition_filter": {"max_val": 0.75}},
            {"document_dedup": {}},
            {"minhash_dedup": {"num_perm": 32, "bands": 8}},
        ],
    }
)

ARXIV_RECIPE = load_recipe(
    {
        "name": "arxiv",
        "description": "RedPajama-aligned arXiv LaTeX cleanup",
        "process": [
            {"remove_header_mapper": {}},
            {"remove_comments_mapper": {}},
            {"expand_macro_mapper": {}},
            {"remove_bibliography_mapper": {}},
            {"whitespace_normalization_mapper": {}},
            {"char_count_filter": {"min_val": 80}},
            {"word_count_filter": {"min_val": 15}},
            {"alnum_ratio_filter": {"min_val": 0.55}},
            {"document_dedup": {}},
        ],
    }
)

BOOKS_RECIPE = load_recipe(
    {
        "name": "books",
        "description": "RedPajama-aligned Books cleanup",
        "process": [
            {"whitespace_normalization_mapper": {}},
            {"punctuation_normalization_mapper": {}},
            {"remove_repeat_sentences_mapper": {}},
            {"char_count_filter": {"min_val": 200}},
            {"word_count_filter": {"min_val": 30}},
            {"stopword_ratio_filter": {"min_val": 0.1}},
            {"word_repetition_filter": {"max_val": 0.75}},
            {"document_dedup": {}},
        ],
    }
)

#: §8.2.2: 14 OPs — 5 Mappers, 8 Filters (5 of them context-sharing,
#: hence fusible), 1 Deduplicator.
FUSION_BENCH_RECIPE = load_recipe(
    {
        "name": "fusion-bench",
        "description": "the 14-OP recipe of Figure 9 (5 fusible OPs)",
        "process": [
            {"clean_html_mapper": {}},
            {"clean_links_mapper": {}},
            {"clean_email_mapper": {}},
            {"whitespace_normalization_mapper": {}},
            {"remove_long_words_mapper": {"max_len": 40}},
            # 8 filters; the 5 word/line-context ones fuse.
            {"char_count_filter": {"min_val": 50}},
            {"alnum_ratio_filter": {"min_val": 0.5}},
            {"special_char_ratio_filter": {"max_val": 0.3}},
            {"word_count_filter": {"min_val": 10}},
            {"avg_word_length_filter": {"min_val": 2.0, "max_val": 12.0}},
            {"stopword_ratio_filter": {"min_val": 0.05}},
            {"flagged_words_filter": {"max_val": 0.02}},
            {"word_repetition_filter": {"max_val": 0.8}},
            {"document_dedup": {}},
        ],
    }
)

SFT_REFINE = load_recipe(
    {
        "name": "sft-refine",
        "description": "post-tuning refinement: drop low-effort/noisy "
                       "examples, dedup (diversity sampling applied after)",
        "process": [
            {"meta_field_filter": {"key": "language", "values": ["EN"]}},
            {"meta_field_filter": {"key": "usage", "values": ["SFT"]}},
            {"word_count_filter": {"min_val": 25}},
            {"char_count_filter": {"min_val": 120}},
            {"special_char_ratio_filter": {"max_val": 0.25}},
            {"flagged_words_filter": {"max_val": 0.0}},
            {"alnum_ratio_filter": {"min_val": 0.6}},
            {"document_dedup": {}},
        ],
    }
)

IFT_REFINE = load_recipe(
    {
        "name": "ift-refine",
        "description": "Alpaca-CoT-IFT refinement for continued pre-training",
        "process": [
            {"word_count_filter": {"min_val": 25}},
            {"special_char_ratio_filter": {"max_val": 0.25}},
            {"flagged_words_filter": {"max_val": 0.0}},
            {"stopword_ratio_filter": {"min_val": 0.08}},
            {"document_dedup": {}},
        ],
    }
)

ALL_RECIPES: dict[str, Recipe] = {
    r.name: r
    for r in (
        PRETRAIN_REFINE, ARXIV_RECIPE, BOOKS_RECIPE, FUSION_BENCH_RECIPE,
        SFT_REFINE, IFT_REFINE,
    )
}
