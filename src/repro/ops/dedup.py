"""Deduplicator OPs — dataset-level duplicate removal (paper Sec. 4.2).

Four built-ins covering the paper's "hash-based and vector-based"
methods [9, 15, 73]:

* :class:`DocumentDedup`        — exact sha256 on normalized text,
* :class:`MinhashDedup`         — MinHash-LSH over word shingles (Broder),
* :class:`SimhashDedup`         — 64-bit SimHash with banded Hamming search
  (Charikar),
* :class:`VectorDedup`          — ``pyspark.ml`` MinHashLSH over HashingTF
  term vectors with an ``approxSimilarityJoin`` (vector-space method).

Candidate pairs from LSH are resolved into duplicate *clusters* with a
driver-side union–find; at the SFs this repo runs (≤ ~10^5 docs) the
pair set is tiny, so the driver step is safe — documented substitution
for an iterative connected-components job at production scale.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F

from repro.core import schema
from repro.core.base import Deduplicator
from repro.core.registry import register

# 2^31-1: with a, b, x < p the product a·x < 2^62 stays inside int64,
# which matters under Spark 4's default ANSI overflow checking.
_MERSENNE = (1 << 31) - 1


def _normalized(text: Column) -> Column:
    """Whitespace/case-insensitive canonical form for exact matching."""
    return F.regexp_replace(F.lower(F.trim(text)), r"\s+", " ")


def _with_ids(df: DataFrame) -> DataFrame:
    """Attach a *unique* per-row ``_dj_id`` and cache to stabilize it.

    Content hashes alone collide for exact duplicates (which near-dup
    OPs must also remove), so the id combines the content hash with a
    ``monotonically_increasing_id`` disambiguator; caching pins the
    assignment across the candidate-collection and final anti-join
    evaluations.
    """
    return df.withColumn(
        "_dj_id",
        F.concat_ws(
            "-",
            F.sha2(F.col(schema.TEXT_COL), 256),
            F.monotonically_increasing_id().cast("string"),
        ),
    ).cache()


def _union_find(pairs: list[tuple[str, str]]) -> dict[str, str]:
    """id → cluster-representative id (min id per component)."""
    parent: dict[str, str] = {}

    def find(x: str) -> str:
        parent.setdefault(x, x)
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for a, b in pairs:
        ra, rb = find(a), find(b)
        if ra != rb:
            # Min id wins as representative → deterministic clusters.
            lo, hi = sorted((ra, rb))
            parent[hi] = lo
    return {x: find(x) for x in parent}


def _drop_cluster_duplicates(df: DataFrame, clusters: dict[str, str]) -> DataFrame:
    """Remove every member of each cluster except the representative."""
    victims = [x for x, rep in clusters.items() if x != rep]
    if not victims:
        return df.drop("_dj_id")
    spark = df.sparkSession
    victims_df = spark.createDataFrame([(v,) for v in victims], ["_dj_id"])
    return df.join(victims_df, on="_dj_id", how="left_anti").drop("_dj_id")


@register("document_dedup")
class DocumentDedup(Deduplicator):
    """Exact dedup on sha256 of case/whitespace-normalized text.

    Keeps, deterministically, the lexicographically-first (text, meta)
    row within each hash group.
    """

    def compute_hash(self, df: DataFrame) -> DataFrame:
        return df.withColumn("_dj_hash", F.sha2(_normalized(F.col(schema.TEXT_COL)), 256))

    def process(self, df: DataFrame) -> DataFrame:
        hashed = self.compute_hash(df)
        w = Window.partitionBy("_dj_hash").orderBy(
            F.col(schema.TEXT_COL), F.to_json(F.col(schema.META_COL))
        )
        return (
            hashed.withColumn("_dj_rn", F.row_number().over(w))
            .filter(F.col("_dj_rn") == 1)
            .drop("_dj_hash", "_dj_rn")
        )


def _shingles(words: Column, n: int) -> Column:
    """Hashed word n-gram shingles (non-negative int64s) from a words array."""
    k = F.greatest(F.size(words) - (n - 1), F.lit(0))
    idx = F.sequence(F.lit(1), k)
    return F.when(F.size(words) < n, F.array(F.abs(F.xxhash64(F.array_join(words, " "))))).otherwise(
        F.array_distinct(
            F.transform(
                idx,
                lambda i: F.abs(F.xxhash64(F.array_join(F.slice(words, i, n), " "))),
            )
        )
    )


@register("minhash_dedup")
class MinhashDedup(Deduplicator):
    """MinHash-LSH near-duplicate removal over word 3-gram shingles.

    ``num_perm`` hash permutations ``(a·x+b) mod p`` are banded into
    ``bands`` bands of ``num_perm//bands`` rows; documents sharing any
    band hash are candidate duplicates; candidates are clustered and
    all but the min-id representative dropped. Default (64, 16) ⇒ LSH
    similarity threshold ≈ (1/16)^(1/4) ≈ 0.5 Jaccard.
    """

    cost = 8.0

    def __init__(self, num_perm: int = 64, bands: int = 16, ngram: int = 3, seed: int = 42):
        if num_perm % bands:
            raise ValueError("num_perm must be divisible by bands")
        self.num_perm, self.bands, self.ngram, self.seed = num_perm, bands, ngram, seed
        import numpy as np

        g = np.random.default_rng(seed)
        self._ab = [
            (int(g.integers(1, _MERSENNE)), int(g.integers(0, _MERSENNE)))
            for _ in range(num_perm)
        ]

    def compute_hash(self, df: DataFrame) -> DataFrame:
        words = F.filter(F.split(F.lower(F.col(schema.TEXT_COL)), r"\W+"), lambda w: w != "")
        sh = _shingles(words, self.ngram)
        reduced = F.transform(sh, lambda s: s % F.lit(_MERSENNE))
        sig = F.array(
            *[
                F.array_min(
                    F.transform(reduced, lambda x: (F.lit(a) * x + F.lit(b)) % F.lit(_MERSENNE))
                )
                for a, b in self._ab
            ]
        )
        return df.withColumn("_dj_sig", sig)

    def _candidate_pairs(self, hashed: DataFrame) -> list[tuple[str, str]]:
        r = self.num_perm // self.bands
        bands = F.array(
            *[
                F.xxhash64(
                    F.lit(i), F.array_join(F.slice(F.col("_dj_sig"), i * r + 1, r), ",")
                )
                for i in range(self.bands)
            ]
        )
        exploded = (
            hashed.select("_dj_id", F.explode(bands).alias("_dj_band"))
            .groupBy("_dj_band")
            .agg(F.sort_array(F.collect_set("_dj_id")).alias("ids"))
            .filter(F.size("ids") > 1)
        )
        pairs: set[tuple[str, str]] = set()
        for row in exploded.select("ids").collect():
            ids = row[0]
            pairs.update((ids[0], x) for x in ids[1:])
        return sorted(pairs)

    def process(self, df: DataFrame) -> DataFrame:
        with_id = _with_ids(df)
        hashed = self.compute_hash(with_id)
        clusters = _union_find(self._candidate_pairs(hashed))
        return _drop_cluster_duplicates(with_id, clusters)


@register("simhash_dedup")
class SimhashDedup(Deduplicator):
    """SimHash near-duplicate removal (64-bit, banded Hamming search).

    Per-document 64-bit SimHash over word features (pandas UDF — the
    bit-vote accumulation is Python-intrinsic); candidates share one of
    four 16-bit chunks; pairs within ``max_hamming`` are clustered.
    """

    cost = 8.0

    def __init__(self, max_hamming: int = 3):
        self.max_hamming = int(max_hamming)

    def compute_hash(self, df: DataFrame) -> DataFrame:
        @F.pandas_udf("long")
        def _simhash(s: pd.Series) -> pd.Series:
            import hashlib

            def one(x: str) -> int:
                votes = [0] * 64
                for w in x.lower().split():
                    h = int.from_bytes(hashlib.blake2b(w.encode(), digest_size=8).digest(), "big")
                    for bit in range(64):
                        votes[bit] += 1 if (h >> bit) & 1 else -1
                out = 0
                for bit in range(64):
                    if votes[bit] > 0:
                        out |= 1 << bit
                # Fold into signed int64 for Spark's LongType.
                return out - (1 << 64) if out >= (1 << 63) else out

            return s.map(one)

        return df.withColumn("_dj_simhash", _simhash(F.col(schema.TEXT_COL)))

    def process(self, df: DataFrame) -> DataFrame:
        with_id = _with_ids(df)
        hashed = self.compute_hash(with_id).select("_dj_id", "_dj_simhash").cache()
        chunks = F.array(
            *[
                F.concat(F.lit(f"{i}:"), (F.shiftrightunsigned("_dj_simhash", 16 * i) % (1 << 16)).cast("string"))
                for i in range(4)
            ]
        )
        grouped = (
            hashed.select("_dj_id", "_dj_simhash", F.explode(chunks).alias("_dj_chunk"))
            .groupBy("_dj_chunk")
            .agg(F.collect_list(F.struct("_dj_id", "_dj_simhash")).alias("members"))
            .filter(F.size("members") > 1)
        )
        pairs: set[tuple[str, str]] = set()
        for row in grouped.select("members").collect():
            members = sorted([(m["_dj_id"], m["_dj_simhash"]) for m in row[0]])
            for i in range(len(members)):
                for j in range(i + 1, len(members)):
                    ham = bin((members[i][1] ^ members[j][1]) & ((1 << 64) - 1)).count("1")
                    if ham <= self.max_hamming:
                        pairs.add((members[i][0], members[j][0]))
        clusters = _union_find(sorted(pairs))
        return _drop_cluster_duplicates(with_id, clusters)


@register("vector_dedup")
class VectorDedup(Deduplicator):
    """Vector-space dedup: HashingTF term vectors + ``pyspark.ml``
    MinHashLSH ``approxSimilarityJoin`` under Jaccard distance."""

    cost = 10.0

    def __init__(self, threshold: float = 0.3, num_features: int = 1 << 14,
                 num_tables: int = 8, seed: int = 7):
        self.threshold = float(threshold)
        self.num_features = int(num_features)
        self.num_tables = int(num_tables)
        self.seed = seed

    def compute_hash(self, df: DataFrame) -> DataFrame:
        from pyspark.ml.feature import HashingTF

        words = F.filter(F.split(F.lower(F.col(schema.TEXT_COL)), r"\W+"), lambda w: w != "")
        tf = HashingTF(
            inputCol="_dj_words", outputCol="_dj_vec",
            numFeatures=self.num_features, binary=True,
        )
        return tf.transform(df.withColumn("_dj_words", words)).drop("_dj_words")

    def process(self, df: DataFrame) -> DataFrame:
        from pyspark.ml.feature import MinHashLSH

        with_id = _with_ids(df)
        vecs = self.compute_hash(with_id)
        # approxSimilarityJoin runs set operations internally, which
        # reject map-typed columns — join on a slim (id, vec) projection
        # and anti-join the victims back on the full dataset. MinHashLSH
        # also rejects all-zero vectors, so empty docs are guarded out
        # (they are exact-dedup territory anyway).
        slim = (
            vecs.filter(F.length(F.trim(F.col(schema.TEXT_COL))) > 0)
            .select("_dj_id", "_dj_vec")
            .cache()
        )
        model = MinHashLSH(
            inputCol="_dj_vec", outputCol="_dj_lsh",
            numHashTables=self.num_tables, seed=self.seed,
        ).fit(slim)
        joined = model.approxSimilarityJoin(
            slim, slim, self.threshold, distCol="_dj_dist"
        )
        pairs_df = (
            joined.select(
                F.col("datasetA._dj_id").alias("a"), F.col("datasetB._dj_id").alias("b")
            )
            .filter(F.col("a") < F.col("b"))
            .distinct()
        )
        pairs = [(r["a"], r["b"]) for r in pairs_df.collect()]
        clusters = _union_find(sorted(pairs))
        return _drop_cluster_duplicates(with_id, clusters)
