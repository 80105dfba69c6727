"""OP registry + Table 1 inventory invariants."""
import pytest

from repro.core.base import Deduplicator, Filter, Formatter, Mapper
from repro.core.registry import all_ops, get_op, ops_by_category, register

ALL = sorted(all_ops())
_BASES = {"formatter": Formatter, "mapper": Mapper, "filter": Filter,
          "deduplicator": Deduplicator}


def test_pool_exceeds_fifty():
    # The paper's headline: "over 50 built-in versatile operators".
    assert len(ALL) > 50


def test_four_categories_present():
    cats = ops_by_category()
    assert set(cats) == {"formatter", "mapper", "filter", "deduplicator"}


@pytest.mark.parametrize("category,minimum", [
    ("formatter", 5), ("mapper", 15), ("filter", 20), ("deduplicator", 4),
])
def test_category_sizes(category, minimum):
    assert len(ops_by_category()[category]) >= minimum


@pytest.mark.parametrize("name", ALL)
def test_op_instantiates(name):
    op = get_op(name)
    assert op.name == name


@pytest.mark.parametrize("name", ALL)
def test_op_category_matches_base(name):
    op = get_op(name)
    assert isinstance(op, _BASES[op.category])


@pytest.mark.parametrize("name", ALL)
def test_op_has_tags_and_doc(name):
    op = get_op(name)
    assert op.tags, f"{name} has no usage tags"
    assert (type(op).__doc__ or "").strip(), f"{name} lacks a docstring"


@pytest.mark.parametrize("name", ALL)
def test_op_naming_convention(name):
    op = get_op(name)
    if op.category in ("mapper", "filter"):
        assert name.endswith(f"_{op.category}")
    else:
        assert "dedup" in name or "formatter" in name


def test_get_op_unknown():
    with pytest.raises(KeyError, match="unknown OP"):
        get_op("no_such_op")


def test_get_op_with_params():
    f = get_op("char_count_filter", min_val=10, max_val=20)
    assert f.min_val == 10 and f.max_val == 20


def test_duplicate_registration_rejected():
    with pytest.raises(ValueError, match="duplicate"):
        @register("char_count_filter")
        class Dup:  # pragma: no cover - never used
            pass


def test_filters_declare_selectivity_and_cost():
    for name in ops_by_category()["filter"]:
        op = get_op(name)
        assert 0.0 < op.selectivity <= 1.0
        assert op.cost > 0
