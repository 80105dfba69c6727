"""Alpaca-CoT-like post-tuning collection (paper Tables 2, 3, 8).

Two layers:

1. A **dataset registry** of 45 tagged datasets whose tag marginals are
   constructed to match Table 8 exactly (the paper's table is likewise
   bookkeeping over the Alpaca-CoT collection): 28 EN / 14 ZH / 3
   multilingual; usage tags 2 MRD / 17 IFT / 23 SFT / 5 preference
   (usage is multi-valued — the tag totals exceed 45 in the paper too);
   27 multi-task / 13 task-specific; 3 human / 12 self-instruct /
   5 mixed / 19 collection.
2. **Example-level generators** for the four featured EN-SFT subsets of
   Table 3 (alpaca, gpteacher, fastchat, gpt4all) and the merged IFT
   corpus of Table 2, each with a quality profile (short/noisy/duplicate
   response rates) reflecting its provenance. Examples carry the raw
   instruction/response in ``meta`` so the retrieval responder
   (``repro.judge``) can train on them, while filters/dedup act on the
   formatted ``text``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import schema
from repro.corpus.text_gen import (
    BOILERPLATE_LINES,
    FLAGGED_SNIPPET,
    _domain_vocab,
    _gibberish,
    clean_sentence,
)

# ---------------------------------------------------------------------------
# Table 8 registry
# ---------------------------------------------------------------------------


@dataclass(frozen=True)
class DatasetTag:
    name: str
    language: str           # English | Chinese | Multilingual
    usage: tuple[str, ...]  # IFT | SFT | Preference | MRD (multi-valued)
    task_type: str | None   # Multi-Task | Task-Specific | None
    gen_method: str | None  # Human-Generated | Self-Instruct | Mixed | Collection | None


def build_registry() -> list[DatasetTag]:
    """45 datasets with tag marginals equal to Table 8."""
    langs = ["English"] * 28 + ["Chinese"] * 14 + ["Multilingual"] * 3
    usages: list[tuple[str, ...]] = []
    for i in range(45):
        if i == 0:
            usages.append(("Instruction Fine-Tuning", "Multi-Round Dialog"))
        elif i < 17:
            usages.append(("Instruction Fine-Tuning",))
        elif i == 17:
            usages.append(("Supervised Fine-Tuning", "Multi-Round Dialog"))
        elif i < 40:
            usages.append(("Supervised Fine-Tuning",))
        else:
            usages.append(("Preference",))
    tasks = ["Multi-Task"] * 27 + ["Task-Specific"] * 13 + [None] * 5
    gens = (["Human-Generated"] * 3 + ["Self-Instruct"] * 12 + ["Mixed"] * 5
            + ["Collection of Datasets"] * 19 + [None] * 6)
    return [
        DatasetTag(f"dataset_{i:02d}", langs[i], usages[i], tasks[i], gens[i])
        for i in range(45)
    ]


def registry_df(spark: SparkSession) -> DataFrame:
    """The registry as a DataFrame for Table 8's group-by counts."""
    rows = [
        (t.name, t.language, list(t.usage), t.task_type, t.gen_method)
        for t in build_registry()
    ]
    return spark.createDataFrame(
        rows, "name string, language string, usage array<string>, "
              "task_type string, gen_method string"
    )


# ---------------------------------------------------------------------------
# Example-level instruction datasets
# ---------------------------------------------------------------------------


@dataclass(frozen=True)
class SFTProfile:
    """Quality profile of one instruction dataset."""

    n_examples: int
    short_resp_rate: float   # low-effort one-liner responses
    noise_rate: float        # gibberish/boilerplate/flagged in response
    dup_rate: float          # duplicated examples
    mean_resp_words: int = 45
    domains: tuple[str, ...] = ("wiki", "web", "books", "code", "dialog")


#: Table 3's four candidate subsets. Alpaca's 52k examples scale 1e-2 →
#: 520; profiles reflect provenance (gpt4all noisiest, gpteacher best).
SFT_SUBSETS: dict[str, SFTProfile] = {
    "alpaca": SFTProfile(520, short_resp_rate=0.16, noise_rate=0.08, dup_rate=0.08),
    "gpteacher": SFTProfile(450, short_resp_rate=0.05, noise_rate=0.02, dup_rate=0.02,
                            mean_resp_words=55),
    "fastchat": SFTProfile(500, short_resp_rate=0.14, noise_rate=0.10, dup_rate=0.10),
    "gpt4all": SFTProfile(600, short_resp_rate=0.25, noise_rate=0.16, dup_rate=0.14,
                          mean_resp_words=30),
}

_VERBS = ("write", "explain", "describe", "list", "summarize", "translate",
          "generate", "create", "identify", "compare")


def _instruction(rng: np.random.Generator, domain: str) -> str:
    words, probs = _domain_vocab(domain)
    verb = str(rng.choice(_VERBS))
    obj = " ".join(rng.choice(words, size=3, p=probs))
    return f"{verb.capitalize()} {obj}"


def _junk_response(rng: np.random.Generator) -> str:
    """A response that is garbage throughout — a low-quality example is
    not clean-text-plus-a-suffix, it is junk wall to wall. Gibberish
    variants contribute many *unique* tokens (vocabulary dilution)."""
    r = rng.random()
    if r < 0.35:
        return " ".join(
            str(rng.choice(BOILERPLATE_LINES)) for _ in range(int(rng.integers(2, 5)))
        )
    if r < 0.75:
        return " ".join(
            _gibberish(rng, int(rng.integers(4, 10)))
            for _ in range(int(rng.integers(15, 45)))
        )
    return (FLAGGED_SNIPPET + " ") * int(rng.integers(3, 8))


def _response(rng: np.random.Generator, domain: str, prof: SFTProfile) -> str:
    if rng.random() < prof.short_resp_rate:
        return str(rng.choice(["Yes.", "No.", "Sure.", "I cannot answer that.", "ok"]))
    if rng.random() < prof.noise_rate:
        return _junk_response(rng)
    words, probs = _domain_vocab(domain)
    n = max(8, int(rng.normal(prof.mean_resp_words, prof.mean_resp_words * 0.3)))
    sents, used = [], 0
    while used < n:
        k = int(rng.integers(6, 14))
        sents.append(clean_sentence(rng, words, probs, k))
        used += k
    return " ".join(sents)


def format_example(instruction: str, response: str) -> str:
    """Alpaca prompt format — also what IFT-formatted eval tasks use."""
    return (
        "### Instruction:\n" + instruction + "\n\n### Response:\n" + response
    )


def sft_dataset(spark: SparkSession, name: str, seed: int | None = None) -> DataFrame:
    """One featured subset as a unified dataset; ``meta`` carries the raw
    fields plus tags (dataset, usage=SFT, language=EN)."""
    prof = SFT_SUBSETS[name]
    rng = np.random.default_rng(seed if seed is not None else abs(hash(name)) % (2**31))
    rows = []
    for i in range(prof.n_examples):
        domain = str(rng.choice(prof.domains))
        ins = _instruction(rng, domain)
        resp = _response(rng, domain, prof)
        rows.append((ins, resp, domain))
    n = len(rows)
    for _ in range(int(n * prof.dup_rate)):
        victim, source = int(rng.integers(0, n)), int(rng.integers(0, n))
        if victim != source:
            rows[victim] = rows[source]
    pdf = pd.DataFrame(
        {
            "text": [format_example(i, r) for i, r, _ in rows],
            "meta": [
                {
                    "dataset": name, "usage": "SFT", "language": "EN",
                    "instruction": i, "response": r, "domain": d,
                }
                for i, r, d in rows
            ],
            "stats": [{} for _ in rows],
        }
    )
    return spark.createDataFrame(pdf, schema.DJ_SCHEMA)


def sft_union(spark: SparkSession) -> DataFrame:
    """The (SFT, EN) candidate pool: union of the four subsets."""
    dfs = [sft_dataset(spark, n, seed=900 + i) for i, n in enumerate(SFT_SUBSETS)]
    out = dfs[0]
    for d in dfs[1:]:
        out = out.unionByName(d)
    return out


def eval_instructions(n: int = 174, seed: int = 4242) -> list[str]:
    """Held-out evaluation prompts for the pairwise GPT-4-sim judging
    (Table 3: win+tie+loss tallies sum to ~174)."""
    rng = np.random.default_rng(seed)
    domains = ("wiki", "web", "books", "code", "dialog")
    return [_instruction(rng, str(rng.choice(domains))) for _ in range(n)]


def ift_corpus(spark: SparkSession, target_tokens: int, seed: int = 77,
               refined_quality: bool = False) -> DataFrame:
    """Merged IFT-tagged corpus for Table 2's continued pre-training.

    ``refined_quality=False`` → the raw Alpaca-CoT-IFT merge: noisy,
    heavily duplicated, many low-effort responses. The *refined* variant
    used in Table 2 is produced by running the Data-Juicer recipe over
    this raw corpus — not by flipping this flag — but the flag exists to
    generate a smaller already-clean corpus for ablation tests.
    """
    # The raw 17-dataset IFT merge is junk-heavy (the paper's refinement
    # keeps only ~30% of it: 15B → 4.7B tokens): a third low-effort
    # responses, lots of boilerplate/gibberish, and ~45% duplication
    # from datasets that bundle each other.
    prof = SFTProfile(
        n_examples=10**9,  # bounded by token budget below
        short_resp_rate=0.04 if refined_quality else 0.32,
        noise_rate=0.02 if refined_quality else 0.30,
        dup_rate=0.0 if refined_quality else 0.45,
        mean_resp_words=50,
    )
    rng = np.random.default_rng(seed)
    rows, used = [], 0
    while used < target_tokens:
        domain = str(rng.choice(prof.domains))
        ins = _instruction(rng, domain)
        resp = _response(rng, domain, prof)
        text = format_example(ins, resp)
        rows.append((text, ins, resp, domain))
        used += len(text.split())
    n = len(rows)
    for _ in range(int(n * prof.dup_rate)):
        victim, source = int(rng.integers(0, n)), int(rng.integers(0, n))
        if victim != source:
            rows[victim] = rows[source]
    pdf = pd.DataFrame(
        {
            "text": [t for t, *_ in rows],
            "meta": [
                {"dataset": "alpaca_cot_ift", "usage": "IFT", "language": "EN",
                 "instruction": i, "response": r, "domain": d}
                for _, i, r, d in rows
            ],
            "stats": [{} for _ in rows],
        }
    )
    return spark.createDataFrame(pdf, schema.DJ_SCHEMA)
