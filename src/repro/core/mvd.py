"""Multivalued dependencies (Sec. 3.1 and 5.2 of the paper).

An MVD ``X ->> Y1 | ... | Ym`` (m >= 2) has *key* X and pairwise
disjoint non-empty *dependents* Y1..Ym. Instances are immutable and
canonical (dependents sorted), so they hash/compare structurally --
required by the miner's visited sets and by ``M_eps`` deduplication.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable


def _canon_deps(deps: Iterable[Iterable[str]]) -> tuple[frozenset, ...]:
    return tuple(sorted((frozenset(d) for d in deps), key=lambda d: tuple(sorted(d))))


@dataclass(frozen=True)
class MVD:
    """Canonical MVD. Build via :meth:`of` (validates and canonicalizes)."""

    key: frozenset
    deps: tuple[frozenset, ...] = field()

    @staticmethod
    def of(key: Iterable[str], deps: Iterable[Iterable[str]]) -> "MVD":
        key = frozenset(key)
        cdeps = _canon_deps(deps)
        if len(cdeps) < 2:
            raise ValueError("an MVD needs at least two dependents")
        seen: set = set()
        for d in cdeps:
            if not d:
                raise ValueError("empty dependent")
            if d & key:
                raise ValueError(f"dependent {sorted(d)} overlaps key {sorted(key)}")
            if d & seen:
                raise ValueError("dependents must be pairwise disjoint")
            seen |= d
        return MVD(key, cdeps)

    # -- structure ------------------------------------------------------
    @property
    def attributes(self) -> frozenset:
        return self.key.union(*self.deps)

    @property
    def n_deps(self) -> int:
        return len(self.deps)

    def dep_of(self, attr: str) -> frozenset | None:
        """The dependent containing ``attr``, or None (e.g. attr in key)."""
        for d in self.deps:
            if attr in d:
                return d
        return None

    def separates(self, a: str, b: str) -> bool:
        """True iff a and b occur in two distinct dependents (Def. 5.5)."""
        da, db = self.dep_of(a), self.dep_of(b)
        return da is not None and db is not None and da is not db

    # -- refinement partial order (Sec. 5.2) ----------------------------
    def refines(self, other: "MVD") -> bool:
        """self >= other: same key, every dependent of self inside one of other."""
        if self.key != other.key:
            return False
        return all(any(d <= e for e in other.deps) for d in self.deps)

    def strictly_refines(self, other: "MVD") -> bool:
        return self != other and self.refines(other)

    def join(self, other: "MVD") -> "MVD":
        """``phi v psi``: dependents are all non-empty pairwise intersections.

        Refines both operands (Lemma 5.4 context). Keys must match.
        """
        if self.key != other.key:
            raise ValueError("join requires identical keys")
        parts = [a & b for a in self.deps for b in other.deps if a & b]
        return MVD.of(self.key, parts)

    def merge(self, i: int, j: int) -> "MVD":
        """Coarsen by merging dependents i and j (the getFullMVDs step)."""
        if i == j:
            raise ValueError("cannot merge a dependent with itself")
        merged = self.deps[i] | self.deps[j]
        rest = [d for k, d in enumerate(self.deps) if k not in (i, j)]
        return MVD.of(self.key, rest + [merged])

    def __str__(self) -> str:  # e.g. "AB ->> C|DE"
        k = "".join(sorted(self.key)) or "{}"
        ds = "|".join("".join(sorted(d)) for d in self.deps)
        return f"{k} ->> {ds}"
