"""Binary group encodings of Appendix A.

Groups are ordered lexicographically; an entity/subgroup is a 0/1
vector over that order; membership is a bitwise AND test; a pair's
encoding is the concatenation of the two entity encodings, checked in
both directions (the EM task is symmetric, §3.2.2).
"""
from __future__ import annotations

import numpy as np


class GroupEncoder:
    """Encoder for a fixed universe of level-1 groups."""

    def __init__(self, groups: list[str]):
        self.groups = sorted(set(groups))
        self.index = {g: i for i, g in enumerate(self.groups)}
        self.m = len(self.groups)

    def encode(self, groups) -> np.ndarray:
        """0/1 vector for an entity's group set or a subgroup."""
        v = np.zeros(self.m, dtype=np.uint8)
        for g in groups:
            v[self.index[g]] = 1
        return v

    @staticmethod
    def belongs(entity: np.ndarray, subgroup: np.ndarray) -> bool:
        """e belongs to s iff (s AND e) == s (Appendix A)."""
        return bool(np.array_equal(np.bitwise_and(subgroup, entity), subgroup))

    def encode_pair(self, groups_i, groups_j) -> np.ndarray:
        """Concatenated encoding of an entity pair."""
        return np.concatenate([self.encode(groups_i), self.encode(groups_j)])

    def pair_belongs(
        self, pair_enc: np.ndarray, s, s_prime
    ) -> bool:
        """Pairwise legitimacy: (s, s') matches the pair in either
        direction — e_i∈s ∧ e_j∈s', or e_i∈s' ∧ e_j∈s."""
        e_i, e_j = pair_enc[: self.m], pair_enc[self.m :]
        a, b = self.encode(s), self.encode(s_prime)
        return (self.belongs(e_i, a) and self.belongs(e_j, b)) or (
            self.belongs(e_i, b) and self.belongs(e_j, a)
        )
