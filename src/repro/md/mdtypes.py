"""Matching-dependency declarations (paper §2.2).

Normalised form (the paper reduces every MD to it): one similarity
comparison and one identification pair,

    ``R1[A] ≈ R2[B]  →  R1[A] ⇌ R2[B]``

(our datasets' MDs compare the same attribute pair they identify, as all
MDs in the paper's experiments do — titles, cast names, writer names,
venues).
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class MD:
    """``left_rel[left_attr] ≈ right_rel[right_attr] → ⇌`` with a
    similarity threshold used when precomputing the similar-pair table."""

    name: str
    left_rel: str
    left_attr: str
    right_rel: str
    right_attr: str
    threshold: float = 0.55

    @property
    def constraint_id(self) -> str:
        return f"md:{self.name}"


#: Precomputed similar-pair table for one MD: for each left value the
#: top-k_m similar right values (and the reverse map), produced by the
#: Spark blocked similarity join.
@dataclass
class SimTable:
    md: MD
    left_to_right: dict[object, list[tuple[object, float]]]
    right_to_left: dict[object, list[tuple[object, float]]]

    @staticmethod
    def from_pairs(md: MD, pairs: list[tuple[object, object, float]], k: int) -> "SimTable":
        """Build both directions from scored pairs, keeping top-k each way."""
        l2r: dict[object, list[tuple[object, float]]] = {}
        r2l: dict[object, list[tuple[object, float]]] = {}
        for lv, rv, s in pairs:
            l2r.setdefault(lv, []).append((rv, s))
            r2l.setdefault(rv, []).append((lv, s))
        for m in (l2r, r2l):
            for key, vals in m.items():
                vals.sort(key=lambda t: (-t[1], str(t[0])))
                del vals[k:]
        return SimTable(md, l2r, r2l)
