"""Unit tests for the Appendix A binary group encodings."""
import numpy as np
import pytest

from repro.core.encoding import GroupEncoder

# Universe of Figure 1 level-1 groups; lexicographic order is
# Female, Jazz, Male, Pop, Rock — as in the paper's Example 4.
ENC = GroupEncoder(["Male", "Female", "Pop", "Rock", "Jazz"])


def test_lexicographic_order():
    assert ENC.groups == ["Female", "Jazz", "Male", "Pop", "Rock"]


def test_example4_entity_encoding():
    # entity with groups {Female, Pop, Rock} -> <1,0,0,1,1>
    np.testing.assert_array_equal(
        ENC.encode(["Female", "Pop", "Rock"]), np.array([1, 0, 0, 1, 1], dtype=np.uint8)
    )


def test_example4_subgroup_encoding():
    # subgroup {Female, Pop} -> <1,0,0,1,0>
    np.testing.assert_array_equal(
        ENC.encode(["Female", "Pop"]), np.array([1, 0, 0, 1, 0], dtype=np.uint8)
    )


def test_belongs_via_bitwise_and():
    e = ENC.encode(["Female", "Pop", "Rock"])
    assert ENC.belongs(e, ENC.encode(["Female", "Pop"]))
    assert ENC.belongs(e, ENC.encode(["Female"]))
    assert not ENC.belongs(e, ENC.encode(["Male"]))
    assert not ENC.belongs(e, ENC.encode(["Female", "Jazz"]))


def test_empty_subgroup_always_belongs():
    assert ENC.belongs(ENC.encode(["Male"]), ENC.encode([]))


def test_pair_encoding_concatenates():
    pe = ENC.encode_pair(["Female"], ["Male", "Jazz"])
    assert pe.shape == (2 * ENC.m,)
    np.testing.assert_array_equal(pe[: ENC.m], ENC.encode(["Female"]))
    np.testing.assert_array_equal(pe[ENC.m :], ENC.encode(["Male", "Jazz"]))


def test_pair_belongs_both_directions():
    pe = ENC.encode_pair(["Female", "Pop"], ["Male", "Jazz"])
    # direct direction
    assert ENC.pair_belongs(pe, ["Female"], ["Male"])
    # swapped direction must also count (symmetric EM, §3.2.2)
    assert ENC.pair_belongs(pe, ["Male"], ["Female"])
    assert not ENC.pair_belongs(pe, ["Female"], ["Rock"])


def test_pair_belongs_subgroup_level2():
    pe = ENC.encode_pair(["Female", "Pop", "Rock"], ["Female", "Jazz"])
    assert ENC.pair_belongs(pe, ["Female", "Pop"], ["Female", "Jazz"])
    assert not ENC.pair_belongs(pe, ["Female", "Jazz"], ["Female", "Jazz"])


def test_unknown_group_raises():
    with pytest.raises(KeyError):
        ENC.encode(["Blues"])
