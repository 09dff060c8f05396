"""Minimal hypergraph transversals (the substrate of MineMinSeps, Fig 5).

``nextMinTransversal`` in the paper enumerates minimal transversals of
the family C of already-discovered minimal separators (Theorem 6.1 /
the hypergraph-dualization problem). The asymptotically best algorithm
is Fredman-Khachiyan; at the family sizes Maimon produces per attribute
pair, Berge's sequential algorithm with minimization is exact and fast,
so we use it.
"""
from __future__ import annotations

from typing import Iterable, Sequence


def is_transversal(d: frozenset, sets: Iterable[frozenset]) -> bool:
    """True iff ``d`` intersects every member of ``sets``."""
    return all(d & s for s in sets)


def _minimize(cands: Iterable[frozenset]) -> list[frozenset]:
    """Keep only inclusion-minimal sets."""
    uniq = sorted(set(cands), key=len)
    out: list[frozenset] = []
    for c in uniq:
        if not any(o <= c for o in out):
            out.append(c)
    return out


def minimal_transversals(sets: Sequence[frozenset]) -> list[frozenset]:
    """All minimal transversals of ``sets`` (Berge's algorithm).

    The empty family has the single transversal ``{}``. A family
    containing the empty set has no transversal (cannot be hit).
    Deterministic output order (by size, then sorted elements).
    """
    if any(not s for s in sets):
        return []
    trs: list[frozenset] = [frozenset()]
    for s in sets:
        nxt: list[frozenset] = []
        for t in trs:
            if t & s:
                nxt.append(t)
            else:
                nxt.extend(t | {x} for x in s)
        trs = _minimize(nxt)
    return sorted(trs, key=lambda t: (len(t), tuple(sorted(t))))
