"""Table 8 — statistics of the post-tuning collection, via group-bys
over the tagged dataset registry (the Alpaca-CoT substitute)."""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee, get_spark  # noqa: E402

from pyspark.sql import functions as F  # noqa: E402

from repro.corpus.posttuning import registry_df  # noqa: E402

PAPER_T8 = {
    "Language": {"English": 28, "Chinese": 14, "Multilingual": 3},
    "Usage": {"Multi-Round Dialog": 2, "Instruction Fine-Tuning": 17,
              "Supervised Fine-Tuning": 23, "Preference": 5},
    "Task Type": {"Multi-Task": 27, "Task-Specific": 13},
    "Generation Method": {"Human-Generated": 3, "Self-Instruct": 12,
                          "Mixed": 5, "Collection of Datasets": 19},
}


def run(spark, out=print) -> dict[str, dict[str, int]]:
    reg = registry_df(spark).cache()
    ours: dict[str, dict[str, int]] = {}
    ours["Language"] = {
        r["language"]: r["n"]
        for r in reg.groupBy("language").agg(F.count("*").alias("n")).collect()
    }
    ours["Usage"] = {
        r["u"]: r["n"]
        for r in reg.select(F.explode("usage").alias("u"))
        .groupBy("u").agg(F.count("*").alias("n")).collect()
    }
    ours["Task Type"] = {
        r["task_type"]: r["n"]
        for r in reg.filter(F.col("task_type").isNotNull())
        .groupBy("task_type").agg(F.count("*").alias("n")).collect()
    }
    ours["Generation Method"] = {
        r["gen_method"]: r["n"]
        for r in reg.filter(F.col("gen_method").isNotNull())
        .groupBy("gen_method").agg(F.count("*").alias("n")).collect()
    }
    out("Table 8 — post-tuning dataset statistics (paper vs ours)")
    out(f"{'Category':<20} {'Sub-Category':<26} {'paper':>6} {'ours':>6}")
    for cat, subs in PAPER_T8.items():
        for sub, n in subs.items():
            out(f"{cat:<20} {sub:<26} {n:>6} {ours[cat].get(sub, 0):>6}")
    return ours


def main() -> None:
    tee = Tee("table8_posttuning_stats")
    spark = get_spark("table8")
    run(spark, out=tee)
    tee.close()
    spark.stop()


if __name__ == "__main__":
    main()
