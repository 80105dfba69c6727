"""Figure 8 (§8.2.1) — end-to-end stand-alone processing performance.

Runs the Books and arXiv recipes over their synthetic datasets twice:
once with the RedPajama-style baseline (python-UDF per OP, full
materialization after every step) and once with Data-Juicer (lazy +
fused + native expressions), under the resource monitor. Reports wall
time, average/peak RSS and CPU utilization, and the paper's headline
reductions for comparison (avg −55.6% time / −63.0% memory / −52.2%
CPU; max −88.7% time on arXiv, 22.9% memory on Books).
"""
from __future__ import annotations

import sys
import tempfile

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from repro.core.pipeline import run_recipe  # noqa: E402
from repro.corpus import components as C  # noqa: E402
from repro.recipes import ARXIV_RECIPE, BOOKS_RECIPE  # noqa: E402
from repro.sysopt.baseline import arxiv_steps, books_steps, run_baseline  # noqa: E402
from repro.sysopt.monitor import ResourceMonitor  # noqa: E402


def _measure_baseline(df, steps):
    with tempfile.TemporaryDirectory() as tmp, ResourceMonitor() as mon:
        out, _ = run_baseline(df, tmp, steps)
        out.count()
    return mon.report


def _measure_dj(df, recipe):
    with ResourceMonitor() as mon:
        out, _ = run_recipe(df, recipe, mode="fused")
        out.count()
    return mon.report


def run(spark, scale: float = 2e-5, out=print) -> dict:
    datasets = {
        "books": (C.component(spark, "books", scale).cache(), BOOKS_RECIPE, books_steps()),
        "arxiv": (C.component(spark, "arxiv", scale).cache(), ARXIV_RECIPE, arxiv_steps()),
    }
    out("Figure 8 — end-to-end processing: RedPajama-style baseline vs Data-Juicer")
    out(f"{'dataset':<8} {'system':<10} {'wall_s':>8} {'avg_rss_MB':>11} "
        f"{'peak_rss_MB':>12} {'cpu_util':>9}")
    results = {}
    for name, (df, recipe, steps) in datasets.items():
        df.count()  # materialize the input out of the measurement
        # untimed warm-up of both systems (JIT, codegen, shuffle setup)
        _measure_baseline(df, steps)
        _measure_dj(df, recipe)
        base = _measure_baseline(df, steps)
        dj = _measure_dj(df, recipe)
        for sysname, rep in (("baseline", base), ("data-juicer", dj)):
            out(f"{name:<8} {sysname:<10} {rep.wall_seconds:>8.1f} "
                f"{rep.avg_rss_bytes/2**20:>11.0f} {rep.peak_rss_bytes/2**20:>12.0f} "
                f"{rep.avg_cpu_utilization:>9.2f}")
        saved = 100 * (1 - dj.wall_seconds / base.wall_seconds)
        out(f"{name}: Data-Juicer saves {saved:.1f}% wall time "
            "(paper: avg 55.6%, max 88.7%)")
        results[name] = (base, dj)
    return results


def main() -> None:
    tee = Tee("fig8_end_to_end")
    spark = get_spark("fig8")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
