"""Cache / checkpoint management with compression (paper Sec. 5.1.1, 7, App. A.2).

Reproduces the Huggingface-datasets-style per-OP cache model over the
local filesystem:

* **cache mode** — after every OP the dataset is persisted (one cache
  set per OP, plus one for the loaded original, plus one extra for the
  first Filter which adds the ``stats`` column);
* **checkpoint mode** — only the latest state is kept; older cache sets
  are cleaned after each OP, so at most 3×S bytes live at once;
* **compression** — caches may be written gzip- or bzip2-compressed and
  are decompressed transparently on reload (paper used zstd/LZ4, which
  need native wheels unavailable offline; the system behaviour —
  compress after each OP, transparent re-read, measurable space saving —
  is identical; documented in DESIGN.md).

The closed-form space models of Appendix A.2 are provided as functions
and asserted against measured cache-set counts in tests.
"""
from __future__ import annotations

import os
import shutil

from pyspark.sql import DataFrame, SparkSession

_CODECS = {None: "none", "none": "none", "gzip": "gzip", "bzip2": "bzip2"}


def cache_mode_space(n_mappers: int, n_filters: int, n_dedup: int, dataset_size: float) -> float:
    """Peak cache bytes in cache mode (App. A.2):
    ``(1 + M + F + 1[F>0] + D) × S``."""
    return (1 + n_mappers + n_filters + (1 if n_filters > 0 else 0) + n_dedup) * dataset_size


def checkpoint_mode_space(dataset_size: float) -> float:
    """Peak cache bytes in checkpoint mode (App. A.2): ``3 × S``."""
    return 3.0 * dataset_size


class CacheManager:
    """Per-OP dataset cache over local jsonl files.

    ``mode='cache'`` keeps every OP's cache set; ``mode='checkpoint'``
    keeps only the latest two (the in-flight write plus its predecessor),
    cleaning older sets after each save — the A.2 cleanup pipeline.
    """

    def __init__(self, base_dir: str, mode: str = "cache", compression: str | None = None):
        if mode not in ("cache", "checkpoint"):
            raise ValueError(f"unknown mode {mode!r}")
        if compression not in _CODECS:
            raise ValueError(f"unknown compression {compression!r}; use gzip|bzip2|None")
        self.base_dir = base_dir
        self.mode = mode
        self.compression = _CODECS[compression]
        self._saved: list[str] = []  # op cache dirs, oldest first
        os.makedirs(base_dir, exist_ok=True)

    # -- paths --------------------------------------------------------------
    def _dir_for(self, step: int, op_name: str) -> str:
        return os.path.join(self.base_dir, f"{step:03d}_{op_name}")

    def cache_sets(self) -> list[str]:
        """Currently existing cache-set directories (sorted)."""
        return sorted(
            d for d in os.listdir(self.base_dir)
            if os.path.isdir(os.path.join(self.base_dir, d))
        )

    def total_bytes(self) -> int:
        """Total bytes across all live cache sets."""
        total = 0
        for root, _, files in os.walk(self.base_dir):
            total += sum(os.path.getsize(os.path.join(root, f)) for f in files)
        return total

    # -- save / load --------------------------------------------------------
    def save(self, df: DataFrame, step: int, op_name: str) -> str:
        """Materialize ``df`` as this step's cache set; returns its path.

        In checkpoint mode, cleans predecessors beyond the previous set
        *after* the new set is written (A.2: at most two sets coexist,
        three counting the original dataset's cache at step 0).
        """
        path = self._dir_for(step, op_name)
        writer = df.write.mode("overwrite")
        if self.compression != "none":
            writer = writer.option("compression", self.compression)
        writer.json(path)
        self._saved.append(path)
        if self.mode == "checkpoint":
            # keep the original dataset's cache (step 0) + latest two.
            keep = {self._saved[0], *self._saved[-2:]}
            for old in self._saved[:-2]:
                if old not in keep and os.path.isdir(old):
                    shutil.rmtree(old)
        return path

    def load(self, spark: SparkSession, path: str) -> DataFrame:
        """Reload a cache set (compressed files are read transparently)."""
        from repro.core import schema as _schema

        df = spark.read.schema(_schema.DJ_SCHEMA).json(path)
        return df

    def latest(self) -> str | None:
        """Path of the most recent surviving cache set, if any."""
        for path in reversed(self._saved):
            if os.path.isdir(path):
                return path
        return None

    def clear(self) -> None:
        """Drop every cache set."""
        shutil.rmtree(self.base_dir, ignore_errors=True)
        os.makedirs(self.base_dir, exist_ok=True)
        self._saved.clear()
