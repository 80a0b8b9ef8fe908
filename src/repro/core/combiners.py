"""Combiner operators (paper §IV-B): set-based merging of seeker results.

A combiner receives ordered table collections (each the output of a seeker
or another combiner) and merges them: Intersection, Union, Difference,
Counter. Output ordering is deterministic and defined w.r.t. the combiner's
*declared* input order (not execution order), so the optimizer's reordering
cannot change the output (Theorem 1).
"""
from __future__ import annotations

from dataclasses import dataclass

Ranked = list[int]  # ordered table ids, best first


class Combiner:
    type_name: str = "?"
    k: int = 10

    def apply(self, inputs: list[Ranked]) -> Ranked:
        raise NotImplementedError


@dataclass
class Intersect(Combiner):
    """Tables present in *every* input; ordered by the first declared
    input's ranking."""

    k: int = 10
    type_name: str = "Intersect"

    def apply(self, inputs: list[Ranked]) -> Ranked:
        if not inputs:
            return []
        keep = set(inputs[0])
        for other in inputs[1:]:
            keep &= set(other)
        return [t for t in inputs[0] if t in keep][: self.k]


@dataclass
class Union(Combiner):
    """All tables of all inputs, first-seen order across declared inputs."""

    k: int = 10
    type_name: str = "Union"

    def apply(self, inputs: list[Ranked]) -> Ranked:
        out, seen = [], set()
        for ranked in inputs:
            for t in ranked:
                if t not in seen:
                    seen.add(t)
                    out.append(t)
        return out[: self.k]


@dataclass
class Difference(Combiner):
    """Tables of the first input that are absent from the second
    (exactly two inputs; non-commutative — never reordered, §VII-B)."""

    k: int = 10
    type_name: str = "Difference"

    def apply(self, inputs: list[Ranked]) -> Ranked:
        assert len(inputs) == 2, "Difference takes exactly two inputs"
        drop = set(inputs[1])
        return [t for t in inputs[0] if t not in drop][: self.k]


@dataclass
class Counter(Combiner):
    """Counts table occurrences across inputs; descending frequency with a
    TableId tie-break (the union-search aggregator, §VII-A). The tie-break
    matches the in-DB push-down (``GROUP BY TableId ORDER BY COUNT(*)``),
    so the optimized and unoptimized paths produce identical output."""

    k: int = 10
    type_name: str = "Counter"

    def apply(self, inputs: list[Ranked]) -> Ranked:
        count: dict[int, int] = {}
        for ranked in inputs:
            for t in ranked:
                count[t] = count.get(t, 0) + 1
        ordered = sorted(count, key=lambda t: (-count[t], t))
        return ordered[: self.k]
