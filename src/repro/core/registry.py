"""OP registry — name → class, with category and usage tags.

Reproduces the paper's "rich OP pool" bookkeeping (Sec. 4.3): OPs carry
usage-scenario tags (general / LaTeX / code / language-specific / ...)
that power navigation and Table 1's per-category inventory, which
``jobs/table1_op_pool.py`` regenerates from this registry.
"""
from __future__ import annotations

from typing import Iterable, Type

OP_REGISTRY: dict[str, Type] = {}


def register(name: str, tags: Iterable[str] = ("general",)):
    """Class decorator registering an OP under ``name`` with usage tags."""

    def deco(cls):
        if name in OP_REGISTRY:
            raise ValueError(f"duplicate OP name: {name}")
        cls._name = name
        cls._tags = tuple(tags)
        # Category from the nearest base class that defines one.
        OP_REGISTRY[name] = cls
        return cls

    return deco


def get_op(name: str, **params):
    """Instantiate a registered OP by name with hyper-parameters."""
    _ensure_loaded()
    if name not in OP_REGISTRY:
        raise KeyError(
            f"unknown OP {name!r}; known: {sorted(OP_REGISTRY)}"
        )
    return OP_REGISTRY[name](**params)


def all_ops() -> dict[str, Type]:
    """The full registry (importing the OP modules on first use)."""
    _ensure_loaded()
    return dict(OP_REGISTRY)


def ops_by_category() -> dict[str, list[str]]:
    """Category → sorted OP names, the Table 1 inventory."""
    _ensure_loaded()
    out: dict[str, list[str]] = {}
    for name, cls in OP_REGISTRY.items():
        out.setdefault(cls._category, []).append(name)
    return {k: sorted(v) for k, v in sorted(out.items())}


def _ensure_loaded() -> None:
    # Import OP modules for their registration side effects.
    import repro.ops.dedup  # noqa: F401
    import repro.ops.filters  # noqa: F401
    import repro.ops.formatters  # noqa: F401
    import repro.ops.mappers  # noqa: F401
