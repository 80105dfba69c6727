"""Table 1 — the standardized OP pool inventory.

Regenerates the paper's Table 1 from the live registry: per-category OP
counts (the paper claims "over 50 built-in operators"), process levels,
and usage tags.
"""
from __future__ import annotations

import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _common import Tee  # noqa: E402

from repro.core.registry import all_ops, ops_by_category  # noqa: E402

_LEVELS = {
    "formatter": "Dataset",
    "mapper": "Single-sample; Multi-samples",
    "filter": "Single-sample; Dataset",
    "deduplicator": "Dataset",
}
_FUNCTION = {
    "formatter": "Data format unifying",
    "mapper": "In-place text editing",
    "filter": "Conditional text removing",
    "deduplicator": "Duplication removing",
}


def run(out=print) -> dict[str, list[str]]:
    cats = ops_by_category()
    out("Table 1 — Operator pool overview")
    out(f"{'Category':<14} {'Function':<28} {'Process Level':<30} #OPs")
    for cat, names in cats.items():
        out(f"{cat.capitalize():<14} {_FUNCTION[cat]:<28} {_LEVELS[cat]:<30} {len(names)}")
    total = sum(len(v) for v in cats.values())
    out(f"total OPs: {total} (paper: 'over 50')")
    out("")
    for cat, names in cats.items():
        out(f"[{cat}]")
        for n in names:
            tags = ",".join(all_ops()[n]._tags)
            out(f"  {n:<38} tags={tags}")
    return cats


def main() -> None:
    tee = Tee("table1_op_pool")
    run(tee)
    tee.close()


if __name__ == "__main__":
    main()
