"""Figure 9 (§8.2.2) — effect of context management, OP fusion and
reordering.

Runs the 14-OP recipe (5 Mappers, 8 Filters, 1 Deduplicator; the 5
word-context Filters fuse) over three dataset sizes, with and without
fusion+reordering, and reports normalized times. Paper: up to 24.91%
total-time saving, up to 42.04% on the fusible OPs.
"""
from __future__ import annotations

import sys
import time

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from repro.core.pipeline import Pipeline  # noqa: E402
from repro.corpus import components as C  # noqa: E402
from repro.recipes import FUSION_BENCH_RECIPE  # noqa: E402


def _run_once(df, fused: bool) -> float:
    pipe = Pipeline(FUSION_BENCH_RECIPE, mode="fused" if fused else "lazy")
    t0 = time.perf_counter()
    pipe.run(df).count()
    return time.perf_counter() - t0


def run(spark, scales=(1e-6, 2e-6, 4e-6), out=print) -> dict:
    out("Figure 9 — time with vs without OP fusion + reordering")
    out(f"{'dataset':<16} {'docs':>6} {'unfused_s':>10} {'fused_s':>9} {'saved':>7}")
    results = {}
    for scale in scales:
        df = C.component(spark, "commoncrawl", scale).cache()
        n = df.count()
        _run_once(df, True)  # warm-up: JIT + cache effects out of the diff
        t_unfused = _run_once(df, False)
        t_fused = _run_once(df, True)
        saved = 100 * (1 - t_fused / t_unfused)
        out(f"cc@{scale:<13g} {n:>6} {t_unfused:>10.2f} {t_fused:>9.2f} {saved:>6.1f}%")
        results[scale] = (t_unfused, t_fused)
    out("(paper: saves up to 24.91% of total time; up to 42.04% on fusible OPs)")
    return results


def main() -> None:
    tee = Tee("fig9_fusion")
    spark = get_spark("fig9")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
