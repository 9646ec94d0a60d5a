"""Tests for dataset metadata plumbing."""
import pytest

from repro.em_data.meta import AttrSpec, DatasetMeta, pair_columns


def test_attrspec_validates_kind():
    with pytest.raises(ValueError):
        AttrSpec("x", "stringy")


def _meta():
    return DatasetMeta(
        name="X", domain="d", dtype="structured",
        attrs=(AttrSpec("a", "short_str"), AttrSpec("b", "numeric")),
        sens_attr="a", sens_type="binary",
    )


def test_attr_names():
    assert _meta().attr_names == ("a", "b")


def test_attr_lookup():
    m = _meta()
    assert m.attr("b").kind == "numeric"
    with pytest.raises(KeyError):
        m.attr("zz")


def test_pair_columns():
    cols = pair_columns(_meta())
    assert cols == [
        "pair_id", "l_a", "l_b", "r_a", "r_b",
        "label", "l_groups", "r_groups", "is_train",
    ]


def test_default_threshold():
    assert _meta().threshold == 0.5


def test_meta_frozen():
    m = _meta()
    with pytest.raises(Exception):
        m.name = "Y"
