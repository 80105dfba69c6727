"""Data recipes — all-in-one declarative configuration (paper Sec. 6.1).

A recipe is a mapping with a ``process`` list of ``{op: params}`` items
plus execution settings, loadable from dicts, JSON, or YAML files (the
paper builds on jsonargparse; stdlib json + PyYAML give the same
sources-of-configuration behaviour offline). Incremental modification —
the paper's "subtraction"/"addition" methodologies — is supported via
:func:`override`.
"""
from __future__ import annotations

import copy
import json
from dataclasses import dataclass, field
from typing import Any, Mapping

import yaml

from repro.core.base import Op
from repro.core.registry import get_op


@dataclass
class Recipe:
    """A validated data-processing recipe."""

    name: str
    process: list[dict] = field(default_factory=list)
    exec_mode: str = "fused"  # lazy | fused | eager_cache
    np: int | None = None  # target parallelism (None = session default)
    description: str = ""

    def build_ops(self) -> list[Op]:
        """Instantiate the OP list (validates names and params)."""
        ops = []
        for item in self.process:
            (op_name, params), = item.items() if isinstance(item, dict) and len(item) == 1 \
                else [(item["op"], {k: v for k, v in item.items() if k != "op"})]
            ops.append(get_op(op_name, **(params or {})))
        return ops


def load_recipe(source: str | Mapping[str, Any]) -> Recipe:
    """Load a recipe from a dict, JSON/YAML string, or *.json/*.yaml path."""
    if isinstance(source, Mapping):
        raw = dict(source)
    elif source.lstrip().startswith("{"):
        raw = json.loads(source)
    elif source.endswith((".json", ".yaml", ".yml")):
        with open(source) as f:
            raw = yaml.safe_load(f) if source.endswith((".yaml", ".yml")) else json.load(f)
    else:
        raw = yaml.safe_load(source)
    if not isinstance(raw, dict) or "process" not in raw:
        raise ValueError("recipe must be a mapping with a 'process' list")
    rec = Recipe(
        name=raw.get("name", "unnamed"),
        process=list(raw["process"]),
        exec_mode=raw.get("exec_mode", "fused"),
        np=raw.get("np"),
        description=raw.get("description", ""),
    )
    rec.build_ops()  # fail fast on unknown OPs / bad params
    return rec


def override(recipe: Recipe, **changes: Any) -> Recipe:
    """Non-destructive incremental modification of a recipe.

    ``process=[...]`` replaces the OP list; ``drop_ops=('a','b')``
    removes OPs by name ("subtraction"); ``add_ops=[{...}]`` appends
    ("addition"); ``set_params={'op_name': {...}}`` merges params.
    """
    rec = copy.deepcopy(recipe)
    if "process" in changes:
        rec.process = list(changes.pop("process"))
    for name in changes.pop("drop_ops", ()):  # subtraction approach
        rec.process = [p for p in rec.process if _op_name(p) != name]
    rec.process += list(changes.pop("add_ops", ()))  # addition approach
    for name, params in changes.pop("set_params", {}).items():
        for p in rec.process:
            if _op_name(p) == name:
                key = name if name in p else "op"
                if key == "op":
                    p.update(params)
                else:
                    p[name] = {**(p[name] or {}), **params}
    for k, v in changes.items():
        if not hasattr(rec, k):
            raise AttributeError(f"recipe has no field {k!r}")
        setattr(rec, k, v)
    rec.build_ops()
    return rec


def _op_name(item: dict) -> str:
    if "op" in item:
        return item["op"]
    (name,) = item.keys()
    return name


def to_yaml(recipe: Recipe) -> str:
    """Serialize a recipe back to YAML (reproducibility/traceability)."""
    return yaml.safe_dump(
        {
            "name": recipe.name,
            "description": recipe.description,
            "exec_mode": recipe.exec_mode,
            "np": recipe.np,
            "process": recipe.process,
        },
        sort_keys=False,
    )
