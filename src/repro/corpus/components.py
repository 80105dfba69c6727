"""The 15 pre-training components of Table 7, plus baseline corpora.

Each component's *target token count* is the paper's Table 7 count
scaled by ``scale`` (default 1e-6: 360.9B CommonCrawl tokens → ~361k
synthetic tokens), and its pathology profile reflects the source's
character (CommonCrawl noisy + duplicated, Wikipedia clean, arXiv
LaTeX-wrapped, ...). ``sampling_weight`` reproduces the Table 7 epoch
boosts: Books ×2, Wikipedia ×2.5.

Also exposes the corpora for the Table 2 baselines:

* :func:`redpajama` — the 7 RedPajama components, raw;
* :func:`pile`      — the Pile-flavoured component union, raw;
* :func:`refinedweb` — filtered-web-only (Falcon's training data);
* :func:`union_redpajama_pile` — the "simple union" baseline.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from repro.corpus.text_gen import Profile, generate_component

#: paper Table 7 token counts (exact integers from the paper).
PAPER_TOKENS: dict[str, int] = {
    "commoncrawl": 360_925_581_674,
    "c4": 181_951_688_729,
    "github": 65_076_921_292,
    "books": 26_389_944_579,
    "wikipedia": 17_615_935_449,
    "arxiv": 29_093_082_586,
    "pubmed_central": 25_589_708_647,
    "stackexchange": 19_793_629_900,
    "freelaw": 13_057_506_102,
    "pubmed_abstracts": 5_208_343_613,
    "uspto": 4_021_281_155,
    "europarl": 780_962_770,
    "hackernews": 485_584_871,
    "philpapers": 478_040_431,
    "nih_exporter": 436_414_852,
}

#: paper Table 7 sampling proportions (%), for EXPERIMENTS.md diffing.
PAPER_PROPORTIONS: dict[str, float] = {
    "commoncrawl": 44.91, "c4": 22.64, "github": 8.10, "books": 6.57,
    "wikipedia": 5.48, "arxiv": 3.62, "pubmed_central": 3.18,
    "stackexchange": 2.46, "freelaw": 1.62, "pubmed_abstracts": 0.65,
    "uspto": 0.50, "europarl": 0.10, "hackernews": 0.06,
    "philpapers": 0.06, "nih_exporter": 0.05,
}

#: epoch boosts of high-quality corpora (Table 7 text).
EPOCHS: dict[str, float] = {"books": 2.0, "wikipedia": 2.5}


@dataclass(frozen=True)
class ComponentSpec:
    name: str
    profile: Profile
    paper_tokens: int
    seed: int


_PROFILES: dict[str, Profile] = {
    "commoncrawl": Profile("web", mean_doc_tokens=200, noise_rate=0.35,
                           dup_rate=0.12, flagged_rate=0.06, short_rate=0.08,
                           html_rate=0.25),
    "c4": Profile("web", mean_doc_tokens=180, noise_rate=0.12, dup_rate=0.05,
                  flagged_rate=0.02, short_rate=0.03, html_rate=0.05),
    "github": Profile("code", mean_doc_tokens=220, noise_rate=0.10,
                      dup_rate=0.15, short_rate=0.05),
    "books": Profile("books", mean_doc_tokens=420, noise_rate=0.02),
    "wikipedia": Profile("wiki", mean_doc_tokens=260, noise_rate=0.02,
                         dup_rate=0.01),
    "arxiv": Profile("latex", mean_doc_tokens=380, noise_rate=0.05,
                     dup_rate=0.03, latex_rate=0.9),
    "pubmed_central": Profile("medical", mean_doc_tokens=320, noise_rate=0.05),
    "stackexchange": Profile("dialog", mean_doc_tokens=160, noise_rate=0.10,
                             dup_rate=0.06, html_rate=0.15),
    "freelaw": Profile("legal", mean_doc_tokens=350, noise_rate=0.04),
    "pubmed_abstracts": Profile("medical", mean_doc_tokens=120, noise_rate=0.03),
    "uspto": Profile("patents", mean_doc_tokens=280, noise_rate=0.04),
    "europarl": Profile("parliament", mean_doc_tokens=220, noise_rate=0.03),
    "hackernews": Profile("dialog", mean_doc_tokens=90, noise_rate=0.15,
                          flagged_rate=0.05, short_rate=0.10),
    "philpapers": Profile("philosophy", mean_doc_tokens=300, noise_rate=0.03),
    "nih_exporter": Profile("grants", mean_doc_tokens=180, noise_rate=0.03),
}

COMPONENTS: dict[str, ComponentSpec] = {
    name: ComponentSpec(name, _PROFILES[name], PAPER_TOKENS[name], seed=100 + i)
    for i, name in enumerate(PAPER_TOKENS)
}

DEFAULT_SCALE = 1e-6

_REDPAJAMA = ("commoncrawl", "c4", "github", "books", "wikipedia", "arxiv",
              "stackexchange")
_PILE = ("wikipedia", "books", "arxiv", "github", "stackexchange",
         "pubmed_central", "pubmed_abstracts", "freelaw", "uspto", "europarl",
         "hackernews", "philpapers", "nih_exporter")


def component(spark: SparkSession, name: str, scale: float = DEFAULT_SCALE,
              seed_offset: int = 0) -> DataFrame:
    """Generate one Table 7 component at ``scale`` of its paper tokens."""
    spec = COMPONENTS[name]
    return generate_component(
        spark, name, max(2_000, int(spec.paper_tokens * scale)), spec.profile,
        seed=spec.seed + seed_offset,
    )


def _union(spark: SparkSession, names: tuple[str, ...], scale: float,
           seed_offset: int = 0) -> DataFrame:
    dfs = [component(spark, n, scale, seed_offset) for n in names]
    out = dfs[0]
    for d in dfs[1:]:
        out = out.unionByName(d)
    return out


def redpajama(spark: SparkSession, scale: float = DEFAULT_SCALE) -> DataFrame:
    """Raw RedPajama-flavoured corpus (7 components, unrefined)."""
    return _union(spark, _REDPAJAMA, scale)


def pile(spark: SparkSession, scale: float = DEFAULT_SCALE) -> DataFrame:
    """Raw Pile-flavoured corpus (seed-offset so its docs differ from
    the RedPajama draws of the shared components)."""
    return _union(spark, _PILE, scale, seed_offset=7_000)


def union_redpajama_pile(spark: SparkSession, scale: float = DEFAULT_SCALE) -> DataFrame:
    """The "simple union with the Pile" baseline of Figure 7 — overlap
    components appear twice (that's the point: no merging/dedup)."""
    return redpajama(spark, scale).unionByName(pile(spark, scale))


def refinedweb(spark: SparkSession, scale: float = DEFAULT_SCALE) -> DataFrame:
    """Falcon's RefinedWeb substitute: *filtered web only* — low noise,
    deduplicated at source, but a single domain."""
    prof = Profile("web", mean_doc_tokens=200, noise_rate=0.03, dup_rate=0.01,
                   flagged_rate=0.005, short_rate=0.01, html_rate=0.02)
    # 350B paper tokens for Falcon's pre-training budget.
    return generate_component(spark, "refinedweb",
                              max(2_000, int(350e9 * scale)), prof, seed=555)


def all_components(spark: SparkSession, scale: float = DEFAULT_SCALE) -> dict[str, DataFrame]:
    """All 15 Table 7 components, keyed by name."""
    return {name: component(spark, name, scale) for name in COMPONENTS}
