"""ASMiner: enumerating acyclic schemas from mined eps-MVDs (Sec. 7).

The novel insight reproduced here is Def. 7.1: a *pairwise*
compatibility test on MVDs such that the support of any join tree is
pairwise compatible (Theorem 7.2). ASMiner (Fig 8) therefore reduces
schema enumeration to enumerating maximal independent sets of the
incompatibility graph, synthesizing one acyclic schema per set with
BuildAcyclicSchema (Fig 9).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Iterable, Iterator, Sequence

from repro.core.jointree import JoinTree, build_join_tree, normalize_schema
from repro.core.mvd import MVD
from repro.graphs.mis import maximal_independent_sets


def compatible(phi: MVD, psi: MVD) -> bool:
    """Pairwise compatibility of two MVDs (Def. 7.1).

    phi = X ->> A1|...|Am and psi = Y ->> B1|...|Bk are compatible iff
    there exist i, j with

    1. (split-free) Y <= X Ai and X <= Y Bj, and
    2. X Ai meets at least two distinct B-blocks, and Y Bj meets at
       least two distinct A-blocks.
    """
    x, y = phi.key, psi.key
    for ai in phi.deps:
        xai = x | ai
        if not (y <= xai):
            continue
        if sum(1 for b in psi.deps if xai & b) < 2:
            continue
        for bj in psi.deps:
            ybj = y | bj
            if not (x <= ybj):
                continue
            if sum(1 for a in phi.deps if ybj & a) < 2:
                continue
            return True
    return False


def build_acyclic_schema(q: Iterable[MVD], omega: Iterable[str]) -> tuple[frozenset, ...]:
    """BuildAcyclicSchema (Fig 9): start from {Omega}; apply MVDs in
    ascending key-cardinality order, splitting the single relation that
    contains each key; skip redundant MVDs (splits producing < 2 parts).
    """
    omega = frozenset(omega)
    schema: list[frozenset] = [omega]
    for phi in sorted(q, key=lambda m: (len(m.key), str(m))):
        x = phi.key
        idx = next((i for i, bag in enumerate(schema) if x <= bag), None)
        if idx is None:
            continue  # key split across relations: redundant for this set
        bag = schema[idx]
        parts = {(c | x) & bag for c in phi.deps}
        parts = {p for p in parts if p and p != x}
        if len(parts) < 2:
            continue  # redundant MVD (does not split its relation)
        schema[idx : idx + 1] = sorted(parts, key=lambda p: tuple(sorted(p)))
    return normalize_schema(schema)


@dataclass(frozen=True)
class MinedSchema:
    """One enumerated schema with its supporting MVD set and join tree."""

    bags: tuple[frozenset, ...]
    support: tuple[MVD, ...]
    tree: JoinTree

    @property
    def n_relations(self) -> int:
        return len(self.bags)


def enumerate_schemas(
    mvds: Sequence[MVD],
    omega: Iterable[str],
    *,
    max_schemas: int | None = None,
    deadline_s: float | None = None,
) -> Iterator[MinedSchema]:
    """ASMiner (Fig 8). Yields de-duplicated acyclic schemas synthesized
    from maximal pairwise-compatible subsets of ``mvds``.

    The trivial schema {Omega} (every MVD in the set redundant) is
    skipped. Caps mirror the paper's enumeration windows.
    """
    omega = frozenset(omega)
    mvds = list(mvds)
    n = len(mvds)
    t0 = time.monotonic()
    # Compatibility graph as bitmask adjacency; MIS of incompatibility
    # graph = cliques of compatibility graph handled inside graphs.mis.
    incompat = [0] * n
    for i in range(n):
        for j in range(i + 1, n):
            if not compatible(mvds[i], mvds[j]):
                incompat[i] |= 1 << j
                incompat[j] |= 1 << i
    seen: set[tuple[frozenset, ...]] = set()
    emitted = 0
    for q_idx in maximal_independent_sets(n, incompat):
        if deadline_s is not None and time.monotonic() - t0 > deadline_s:
            return
        q = [mvds[i] for i in sorted(q_idx)]
        bags = build_acyclic_schema(q, omega)
        if len(bags) < 2 or bags in seen:
            continue
        seen.add(bags)
        tree = build_join_tree(bags)
        if tree is None:  # cannot happen for Fig-9 output; defensive
            continue
        yield MinedSchema(bags=bags, support=tuple(q), tree=tree)
        emitted += 1
        if max_schemas is not None and emitted >= max_schemas:
            return
