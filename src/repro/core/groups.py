"""Group model: sensitive attribute types and the intersectional
subgroup hierarchy of §3.2.1 / Figure 1 / Table 1.
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import combinations


@dataclass(frozen=True)
class SensitiveAttr:
    """One sensitive attribute with its domain of level-1 groups."""

    name: str
    kind: str  # 'binary' | 'multi' | 'setwise'
    domain: tuple[str, ...]

    def __post_init__(self) -> None:
        if self.kind not in ("binary", "multi", "setwise"):
            raise ValueError(f"unknown sensitive attr kind: {self.kind}")
        if self.kind == "binary" and len(self.domain) != 2:
            raise ValueError("binary attribute needs exactly 2 groups")


def record_groups(value, attr: SensitiveAttr) -> list[str]:
    """Parse a record's sensitive value into its level-1 groups: a
    setwise value like "Country, Honky Tonk" yields several groups."""
    if value is None:
        return []
    if attr.kind == "setwise":
        return [v.strip() for v in str(value).split(",") if v.strip()]
    return [str(value).strip()]


def all_groups(attrs: list[SensitiveAttr]) -> list[str]:
    """G = union of the attribute domains, in stable (attr, domain) order."""
    out: list[str] = []
    for a in attrs:
        for g in a.domain:
            if g not in out:
                out.append(g)
    return out


def level_subgroups(attrs: list[SensitiveAttr], k: int) -> list[frozenset[str]]:
    """All level-k intersectional subgroups: size-k subsets of G taking
    at most one group per *exclusive* (binary / multi) attribute; a
    setwise attribute may contribute several of its groups (Figure 1:
    level 3 = 2-combinations of genre × one gender group)."""
    if k < 1:
        raise ValueError("level must be >= 1")
    owner: dict[str, SensitiveAttr] = {}
    for a in attrs:
        for g in a.domain:
            owner.setdefault(g, a)
    groups = all_groups(attrs)
    out = []
    for combo in combinations(groups, k):
        per_attr: dict[str, int] = {}
        for g in combo:
            per_attr[owner[g].name] = per_attr.get(owner[g].name, 0) + 1
        if all(
            n == 1 or owner_attr.kind == "setwise"
            for attr_name, n in per_attr.items()
            for owner_attr in [next(a for a in attrs if a.name == attr_name)]
        ):
            out.append(frozenset(combo))
    return out


def subgroup_members(entity_groups: list[str], subgroup: frozenset[str]) -> bool:
    """An entity belongs to subgroup s iff s ⊆ its groups (Appendix A)."""
    return subgroup <= set(entity_groups)
