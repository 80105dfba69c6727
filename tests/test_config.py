"""Data-recipe configuration (paper Sec. 6.1)."""
import json

import pytest

from repro.core.config import Recipe, load_recipe, override, to_yaml
from repro.recipes import ALL_RECIPES, FUSION_BENCH_RECIPE

BASE = {
    "name": "demo",
    "process": [
        {"char_count_filter": {"min_val": 10}},
        {"word_count_filter": {"min_val": 2}},
    ],
}


def test_load_from_dict():
    rec = load_recipe(BASE)
    assert rec.name == "demo" and len(rec.process) == 2


def test_load_from_json_string():
    rec = load_recipe(json.dumps(BASE))
    assert rec.name == "demo"


def test_load_from_yaml_string():
    yml = "name: y\nprocess:\n  - char_count_filter:\n      min_val: 5\n"
    rec = load_recipe(yml)
    assert rec.build_ops()[0].min_val == 5


def test_load_from_yaml_file(tmp_path):
    p = tmp_path / "r.yaml"
    p.write_text("name: f\nprocess:\n  - lowercase_mapper: {}\n")
    assert load_recipe(str(p)).name == "f"


def test_load_from_json_file(tmp_path):
    p = tmp_path / "r.json"
    p.write_text(json.dumps(BASE))
    assert load_recipe(str(p)).name == "demo"


def test_load_rejects_missing_process():
    with pytest.raises(ValueError, match="process"):
        load_recipe({"name": "x"})


def test_load_rejects_unknown_op():
    with pytest.raises(KeyError, match="unknown OP"):
        load_recipe({"name": "x", "process": [{"nope_filter": {}}]})


def test_build_ops_applies_params():
    ops = load_recipe(BASE).build_ops()
    assert ops[0].min_val == 10 and ops[1].min_val == 2


def test_override_subtraction():
    rec = override(load_recipe(BASE), drop_ops=("word_count_filter",))
    assert [o.name for o in rec.build_ops()] == ["char_count_filter"]


def test_override_addition():
    rec = override(load_recipe(BASE), add_ops=[{"document_dedup": {}}])
    assert rec.build_ops()[-1].name == "document_dedup"


def test_override_set_params():
    rec = override(load_recipe(BASE), set_params={"char_count_filter": {"min_val": 99}})
    assert rec.build_ops()[0].min_val == 99


def test_override_does_not_mutate_original():
    base = load_recipe(BASE)
    override(base, drop_ops=("char_count_filter",))
    assert len(base.process) == 2


def test_override_unknown_field():
    with pytest.raises(AttributeError):
        override(load_recipe(BASE), bogus=1)


def test_to_yaml_roundtrip():
    rec = load_recipe(BASE)
    again = load_recipe(to_yaml(rec))
    assert again.process == rec.process and again.name == rec.name


def test_builtin_recipes_valid():
    for name, rec in ALL_RECIPES.items():
        ops = rec.build_ops()
        assert ops, name


def test_fusion_bench_recipe_shape():
    """§8.2.2: 14 OPs — 5 Mappers, 8 Filters, 1 Deduplicator."""
    ops = FUSION_BENCH_RECIPE.build_ops()
    cats = [o.category for o in ops]
    assert len(ops) == 14
    assert cats.count("mapper") == 5
    assert cats.count("filter") == 8
    assert cats.count("deduplicator") == 1
    fusible = [o for o in ops if o.category == "filter" and o.context_keys]
    assert len(fusible) == 5  # "5 of these OPs being fuse-able"
