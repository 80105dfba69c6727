"""Figure 10 (§8.2.3) — system scalability.

Multi-node substitution (DESIGN.md): cores on this machine stand in for
cluster nodes. The same recipe runs over StackExchange-like and
arXiv-like datasets at parallelism 1, 2, 4, 8, 16 ("nodes"), via
``spark.sparkContext`` job-level parallelism control (repartition +
scheduler pools are the single-node analogue of adding Ray workers).
A "Beam-like" configuration — all input squeezed through a 1-partition
load stage regardless of parallelism, reproducing Beam's data-loading
bottleneck — shows the flat curve of the paper.
"""
from __future__ import annotations

import sys
import time

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from repro.core.pipeline import Pipeline  # noqa: E402
from repro.corpus import components as C  # noqa: E402
from repro.recipes import PRETRAIN_REFINE  # noqa: E402
from repro.core.config import override  # noqa: E402

#: dedup collects to the driver (not meaningfully parallel at this SF) —
#: scalability is measured on the mapper+filter body of the recipe.
_RECIPE = override(PRETRAIN_REFINE, drop_ops=("document_dedup", "minhash_dedup"),
                   name="pretrain-refine-scal")


def _run(df, parallelism: int, beam_like: bool = False) -> float:
    # coalesce(n), not repartition(n): a round-robin repartition inserts
    # an exchange and Spark computes the (prunable) projections *before*
    # the shuffle, so the compute stage keeps full parallelism whatever
    # n is. coalesce narrows the scan+compute stage itself to n tasks —
    # the faithful "n workers" model.
    df = df.coalesce(1 if beam_like else parallelism)
    pipe = Pipeline(_RECIPE, mode="fused")
    t0 = time.perf_counter()
    pipe.run(df).count()
    return time.perf_counter() - t0


def run(spark, scale: float = 6e-5, nodes=(1, 2, 4, 8, 16), out=print) -> dict:
    datasets = {
        "stackexchange": C.component(spark, "stackexchange", scale).cache(),
        "arxiv": C.component(spark, "arxiv", scale).cache(),
    }
    out("Figure 10 — scalability ('nodes' = cores on this machine)")
    out(f"{'dataset':<15} {'nodes':>5} {'ray-like_s':>11} {'beam-like_s':>12}")
    results: dict = {}
    beam_nodes = (nodes[0], nodes[-1])  # the flat curve needs only endpoints
    for name, df in datasets.items():
        df.count()
        _run(df, nodes[0])  # untimed warm-up (JIT, codegen)
        for n in nodes:
            t_ray = _run(df, n, beam_like=False)
            t_beam = _run(df, n, beam_like=True) if n in beam_nodes else float("nan")
            out(f"{name:<15} {n:>5} {t_ray:>11.2f} {t_beam:>12.2f}")
            results[(name, n)] = (t_ray, t_beam)
        t_last = results[(name, nodes[-1])][0]
        out(f"{name}: {100*(1-t_last/results[(name, nodes[0])][0]):.1f}% time reduction "
            f"at {nodes[-1]} nodes (paper: up to 87.4% SE / 84.6% arXiv)")
    return results


def main() -> None:
    tee = Tee("fig10_scalability")
    spark = get_spark("fig10")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
