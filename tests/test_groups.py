"""Unit tests for the group model and subgroup hierarchy (§3.2.1)."""
import pytest

from repro.core.groups import (
    SensitiveAttr,
    all_groups,
    level_subgroups,
    record_groups,
    subgroup_members,
)

GENDER = SensitiveAttr("gender", "binary", ("Male", "Female"))
GENRE = SensitiveAttr("genre", "setwise", ("Pop", "Rock", "Jazz"))
VENUE = SensitiveAttr("venue", "multi", ("SIGMOD", "VLDB", "VLDBJ"))


def test_invalid_kind_raises():
    with pytest.raises(ValueError):
        SensitiveAttr("x", "weird", ("a",))


def test_binary_needs_two_groups():
    with pytest.raises(ValueError):
        SensitiveAttr("x", "binary", ("a", "b", "c"))


@pytest.mark.parametrize("value,attr,expected", [
    ("Female", GENDER, ["Female"]),
    ("Pop, Rock", GENRE, ["Pop", "Rock"]),
    ("Pop,Rock , Jazz", GENRE, ["Pop", "Rock", "Jazz"]),
    ("SIGMOD", VENUE, ["SIGMOD"]),
    (None, GENRE, []),
    ("", GENRE, []),
])
def test_record_groups(value, attr, expected):
    assert record_groups(value, attr) == expected


def test_all_groups_union_in_order():
    assert all_groups([GENDER, GENRE]) == ["Male", "Female", "Pop", "Rock", "Jazz"]


def test_level1_is_all_groups():
    subs = level_subgroups([GENDER, GENRE], 1)
    assert {frozenset({g}) for g in ["Male", "Female", "Pop", "Rock", "Jazz"]} == set(subs)


def test_level2_figure1():
    # Figure 1: level-2 = gender × genre combos + genre 2-combos,
    # but never {Male, Female}
    subs = set(level_subgroups([GENDER, GENRE], 2))
    assert frozenset({"Male", "Female"}) not in subs
    assert frozenset({"Female", "Pop"}) in subs
    assert frozenset({"Pop", "Rock"}) in subs  # setwise allows 2 of its own
    assert len(subs) == 9  # C(5,2)=10 minus the {Male,Female} pair


def test_level3_figure1():
    # Figure 1: level-3 enumerates 2-combinations of genre with a gender
    subs = set(level_subgroups([GENDER, GENRE], 3))
    assert frozenset({"Female", "Pop", "Rock"}) in subs
    assert frozenset({"Male", "Pop", "Jazz"}) in subs
    # 6 gender×(genre 2-combos) + the full genre set
    assert len(subs) == 7
    assert frozenset({"Pop", "Rock", "Jazz"}) in subs


def test_level_subgroups_exclusive_attrs_only():
    subs = set(level_subgroups([GENDER, VENUE], 2))
    # one group from each attribute only; no within-attribute pairs
    assert all(len(s) == 2 for s in subs)
    assert frozenset({"SIGMOD", "VLDB"}) not in subs
    assert len(subs) == 2 * 3


def test_level_zero_raises():
    with pytest.raises(ValueError):
        level_subgroups([GENDER], 0)


@pytest.mark.parametrize("entity,subgroup,member", [
    (["Female", "Pop", "Rock"], {"Female", "Pop"}, True),
    (["Female", "Pop", "Rock"], {"Male"}, False),
    (["Female"], {"Female", "Pop"}, False),
    (["Pop", "Rock", "Jazz"], {"Pop", "Rock", "Jazz"}, True),
])
def test_subgroup_members(entity, subgroup, member):
    assert subgroup_members(entity, frozenset(subgroup)) is member
