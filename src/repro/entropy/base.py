"""Entropy-engine abstraction shared by the Maimon reproduction.

Every mining component (Sec 5-7 of the paper) consumes entropies only
through :class:`EntropyEngine`: a memoized oracle for the empirical
entropy ``H(X)`` of an attribute set ``X`` (Eq. 5), with derived helpers
for conditional mutual information ``I(Y;Z|X)`` (Eq. 2) and the
J-measure of MVDs (Sec. 3.2) and acyclic schemas (Eq. 6).

All entropies are in **bits** (log base 2), matching the paper's worked
examples (``H(ABCDEF) = log 4 = 2`` in Example 3.4). Derived measures
are clamped at ``>= 0`` against floating-point noise; the Shannon
inequalities guarantee the true values are non-negative.
"""
from __future__ import annotations

import math
from abc import ABC, abstractmethod
from typing import TYPE_CHECKING, Iterable

if TYPE_CHECKING:  # pragma: no cover - import cycle guard for type hints
    from repro.core.mvd import MVD

AttrSet = frozenset

#: Tolerance added to every ``J <= eps`` / ``I > eps`` comparison. Exact
#: dependencies produce J = 0 only up to float rounding of the entropy
#: sums; without a tolerance, eps = 0 behaves like an arbitrary tiny
#: threshold and Beeri's uniqueness of the full MVD (Sec. 5.2) fails.
FLOAT_TOL = 1e-9


def _fs(cols: Iterable[str]) -> frozenset:
    return cols if isinstance(cols, frozenset) else frozenset(cols)


class EntropyEngine(ABC):
    """Memoized oracle for empirical entropies over one relation.

    Subclasses implement :meth:`_entropy` for a non-empty attribute set;
    the base class provides caching, ``I``, and ``J`` helpers plus call
    statistics (used by the scalability experiments to report work).
    """

    def __init__(self, columns: Iterable[str], n_rows: int):
        self.columns: tuple[str, ...] = tuple(columns)
        if len(set(self.columns)) != len(self.columns):
            raise ValueError("duplicate column names")
        self.n_rows = int(n_rows)
        self._cache: dict[frozenset, float] = {frozenset(): 0.0}
        self.entropy_computations = 0  # cache misses (actual work)
        self.entropy_calls = 0  # all requests

    # -- core oracle ---------------------------------------------------
    @abstractmethod
    def _entropy(self, cols: frozenset) -> float:
        """Compute H(cols) in bits for a non-empty ``cols``."""

    def entropy(self, cols: Iterable[str]) -> float:
        """Memoized H(cols); H(emptyset) = 0."""
        fs = _fs(cols)
        self.entropy_calls += 1
        h = self._cache.get(fs)
        if h is None:
            unknown = fs - set(self.columns)
            if unknown:
                raise KeyError(f"unknown columns {sorted(unknown)}")
            h = self._entropy(fs)
            self.entropy_computations += 1
            self._cache[fs] = h
        return h

    # -- derived measures ----------------------------------------------
    def mutual_info(self, Y: Iterable[str], Z: Iterable[str], X: Iterable[str] = ()) -> float:
        """Conditional mutual information I(Y;Z|X) in bits (Eq. 2).

        Y and Z need not be disjoint from X (``H`` is defined on unions),
        but callers in the miner always pass disjoint sets.
        """
        X, Y, Z = _fs(X), _fs(Y), _fs(Z)
        i = (
            self.entropy(X | Y)
            + self.entropy(X | Z)
            - self.entropy(X | Y | Z)
            - self.entropy(X)
        )
        return max(0.0, i)

    def j_mvd(self, mvd: "MVD") -> float:
        """J-measure of an MVD: sum H(X Yi) - (m-1) H(X) - H(X Y1..Ym)."""
        return self.j_parts(mvd.key, mvd.deps)

    def j_parts(self, key: Iterable[str], deps: Iterable[frozenset]) -> float:
        key = _fs(key)
        deps = list(deps)
        total = key.union(*deps) if deps else key
        j = (
            sum(self.entropy(key | d) for d in deps)
            - (len(deps) - 1) * self.entropy(key)
            - self.entropy(total)
        )
        return max(0.0, j)

    def j_tree(self, bags: list[frozenset], edges: list[tuple[int, int]]) -> float:
        """Lee's measure of a join tree (Eq. 6)."""
        omega = frozenset().union(*bags)
        j = (
            sum(self.entropy(b) for b in bags)
            - sum(self.entropy(bags[u] & bags[v]) for (u, v) in edges)
            - self.entropy(omega)
        )
        return max(0.0, j)

    def j_schema(self, bags: Iterable[frozenset]) -> float:
        """J(S) for an acyclic schema via any of its join trees (Th. 3.3).

        Raises ``ValueError`` if ``bags`` is not acyclic.
        """
        from repro.core.jointree import build_join_tree

        tree = build_join_tree(list(bags))
        if tree is None:
            raise ValueError("schema is not acyclic: no join tree exists")
        return self.j_tree(list(tree.bags), list(tree.edges))

    # -- utilities ------------------------------------------------------
    @property
    def log2_n(self) -> float:
        return math.log2(self.n_rows) if self.n_rows else 0.0

    def cache_info(self) -> dict:
        return {
            "cached": len(self._cache),
            "calls": self.entropy_calls,
            "computations": self.entropy_computations,
        }


def entropy_from_group_sizes(sizes: Iterable[int], n_rows: int) -> float:
    """H from the multiset of value-group sizes (Eq. 5), in bits.

    Groups of size 1 contribute 0 (``1 * log 1``), which is the
    singleton-pruning identity the PLI engines exploit; callers may pass
    only the non-singleton group sizes.
    """
    if n_rows <= 0:
        return 0.0
    s = sum(c * math.log2(c) for c in sizes if c > 1)
    return max(0.0, math.log2(n_rows) - s / n_rows)
