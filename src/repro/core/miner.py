"""MVDMiner: discovery of eps-MVDs with minimal separators (Sec. 6).

Implements Figures 3-6 of the paper plus the appendix optimization
(Figs 16/17):

- :meth:`MVDMiner.mine_min_seps` -- MineMinSeps (Fig 5): the Gunopulos
  "dualize and advance" loop. Maintain the family C of known minimal
  A,B-separators; repeatedly take a minimal transversal D of C and test
  whether the complement of D separates A,B; if so, reduce it to a new
  minimal separator (Theorem 6.1 guarantees completeness).
- :meth:`MVDMiner.reduce_min_sep` -- ReduceMinSep (Fig 4): greedy
  shrink under a fixed global attribute ordering (the completeness
  proof of Theorem 6.2 requires the ordering to be the same across
  calls).
- :meth:`MVDMiner.get_full_mvds` -- getFullMVDs (Fig 6) as a DFS over
  dependent-merges starting from the all-singleton MVD, with the
  pairwise-consistency closure of Fig 16 as sound-and-complete pruning:
  if I(Ci;Cj|S) > eps then *every* satisfying coarsening merges Ci and
  Cj (I is monotone under grouping and bounded by J), so the merge can
  be applied eagerly.

Deviations from the pseudocode, documented in DESIGN.md: a visited set
over canonical partitions (the merge graph is a DAG), and an optional
post-filter dropping returned MVDs strictly refined by other returned
MVDs (the paper's traversal can emit non-full satisfying MVDs).
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field
from itertools import combinations
from typing import Iterable, Sequence

from repro.core.mvd import MVD
from repro.entropy.base import FLOAT_TOL, EntropyEngine
from repro.hypergraph.transversal import minimal_transversals


class DeadlineReached(Exception):
    """Raised internally when the cooperative time budget is exhausted."""


class Deadline:
    """Cooperative wall-clock budget (the paper's TL, scaled down)."""

    def __init__(self, seconds: float | None):
        self.seconds = seconds
        self._t0 = time.monotonic()

    def expired(self) -> bool:
        return self.seconds is not None and (time.monotonic() - self._t0) > self.seconds

    def check(self) -> None:
        if self.expired():
            raise DeadlineReached()


@dataclass
class MinerResult:
    """Output of a mining run; partial if ``timed_out``."""

    epsilon: float
    minseps: dict[tuple[str, str], list[frozenset]] = field(default_factory=dict)
    full_mvds: list[MVD] = field(default_factory=list)
    timed_out: bool = False
    elapsed: float = 0.0
    stats: dict = field(default_factory=dict)

    @property
    def n_minseps(self) -> int:
        return sum(len(v) for v in self.minseps.values())

    @property
    def n_full_mvds(self) -> int:
        return len(self.full_mvds)


_Node = tuple[frozenset, ...]


def _canon(parts: Iterable[frozenset]) -> _Node:
    return tuple(sorted(parts, key=lambda p: tuple(sorted(p))))


class MVDMiner:
    """Mines ``M_eps`` (Eq. 11) over one relation via an entropy engine."""

    def __init__(
        self,
        engine: EntropyEngine,
        epsilon: float,
        *,
        optimized: bool = True,
        prune_nonfull: bool = True,
        max_nodes_per_search: int = 50_000,
        deadline_s: float | None = None,
    ):
        self.engine = engine
        self.eps = float(epsilon)
        # All threshold comparisons use eps + FLOAT_TOL (see entropy.base).
        self.eps_eff = self.eps + FLOAT_TOL
        self.optimized = optimized
        self.prune_nonfull = prune_nonfull
        self.max_nodes = max_nodes_per_search
        self.deadline = Deadline(deadline_s)
        self._sep_memo: dict[tuple[frozenset, str, str], bool] = {}
        # Fixed global ordering p used by ReduceMinSep (Theorem 6.2).
        self.ordering: tuple[str, ...] = tuple(sorted(engine.columns))
        self.nodes_explored = 0

    # ------------------------------------------------------------------
    # getFullMVDs (Fig 6 / Fig 17)
    # ------------------------------------------------------------------
    def _closure(
        self, key: frozenset, parts: list[frozenset], pair: tuple[str, str] | None
    ) -> _Node | None:
        """Pairwise-consistency closure (Fig 16): merge every dependent
        pair with I(Ci;Cj|key) > eps; None if A,B get merged."""
        parts = list(parts)
        changed = True
        while changed:
            changed = False
            for i in range(len(parts)):
                for j in range(i + 1, len(parts)):
                    if self.engine.mutual_info(parts[i], parts[j], key) > self.eps_eff:
                        if pair is not None:
                            a, b = pair
                            pi, pj = parts[i], parts[j]
                            if (a in pi and b in pj) or (b in pi and a in pj):
                                return None
                        parts[i] = parts[i] | parts[j]
                        del parts[j]
                        changed = True
                        break
                if changed:
                    break
        return _canon(parts)

    def get_full_mvds(
        self,
        key: frozenset,
        pair: tuple[str, str] | None = None,
        k: float = math.inf,
        *,
        prune_nonfull: bool | None = None,
    ) -> list[MVD]:
        """Up to ``k`` full eps-MVDs with key ``key`` (separating ``pair``)."""
        key = frozenset(key)
        rest = sorted(set(self.engine.columns) - key)
        if pair is not None and (pair[0] in key or pair[1] in key):
            raise ValueError("pair attributes must not be in the key")
        if len(rest) < 2:
            return []
        root: _Node | None = _canon([frozenset([c]) for c in rest])
        if self.optimized:
            root = self._closure(key, list(root), pair)
            if root is None:
                return []
            if len(root) < 2 or (pair is not None and not _separated(root, pair)):
                return []
        found: list[_Node] = []
        visited: set[_Node] = {root}
        stack: list[_Node] = [root]
        nodes = 0
        while stack and len(found) < k:
            self.deadline.check()
            nodes += 1
            self.nodes_explored += 1
            if nodes > self.max_nodes:
                break  # search budget; partial results (documented heuristic)
            parts = stack.pop()
            if self.engine.j_parts(key, parts) <= self.eps_eff:
                found.append(parts)
                continue
            m = len(parts)
            for i in range(m):
                for j in range(i + 1, m):
                    if pair is not None:
                        a, b = pair
                        pi, pj = parts[i], parts[j]
                        if (a in pi and b in pj) or (b in pi and a in pj):
                            continue  # never merge A's and B's components
                    child_parts = [p for t, p in enumerate(parts) if t not in (i, j)]
                    child_parts.append(parts[i] | parts[j])
                    if len(child_parts) < 2:
                        continue
                    child: _Node | None = _canon(child_parts)
                    if self.optimized:
                        child = self._closure(key, list(child), pair)
                        if child is None or len(child) < 2:
                            continue
                        if pair is not None and not _separated(child, pair):
                            continue
                    if child not in visited:
                        visited.add(child)
                        stack.append(child)
        mvds = [MVD.of(key, parts) for parts in found]
        do_prune = self.prune_nonfull if prune_nonfull is None else prune_nonfull
        if do_prune and len(mvds) > 1:
            mvds = [
                m for m in mvds if not any(o.strictly_refines(m) for o in mvds)
            ]
        return sorted(mvds, key=str)

    # ------------------------------------------------------------------
    # separator predicate (Def. 5.5), memoized
    # ------------------------------------------------------------------
    def separates(self, x: Iterable[str], a: str, b: str) -> bool:
        x = frozenset(x)
        memo_key = (x, a, b) if a < b else (x, b, a)
        hit = self._sep_memo.get(memo_key)
        if hit is not None:
            return hit
        # Necessary condition (Prop. 5.1): I(A;B|X) <= J of any separating MVD.
        if self.engine.mutual_info({a}, {b}, x) > self.eps_eff:
            ans = False
        else:
            ans = bool(self.get_full_mvds(x, (a, b), k=1, prune_nonfull=False))
        self._sep_memo[memo_key] = ans
        return ans

    # ------------------------------------------------------------------
    # ReduceMinSep (Fig 4)
    # ------------------------------------------------------------------
    def reduce_min_sep(self, x: Iterable[str], a: str, b: str) -> frozenset:
        """Greedily shrink a separator to a minimal one, scanning the
        fixed global ordering."""
        s = set(x)
        for attr in self.ordering:
            if attr not in s:
                continue
            self.deadline.check()
            if self.separates(frozenset(s - {attr}), a, b):
                s.remove(attr)
        return frozenset(s)

    # ------------------------------------------------------------------
    # MineMinSeps (Fig 5)
    # ------------------------------------------------------------------
    def mine_min_seps(
        self, a: str, b: str, sink: list[frozenset] | None = None
    ) -> list[frozenset]:
        """All minimal A,B-separators. ``sink`` (if given) receives each
        separator as soon as it is discovered, so deadline aborts still
        report partial progress."""
        c: list[frozenset] = sink if sink is not None else []
        universe = frozenset(set(self.engine.columns) - {a, b})
        if not self.separates(universe, a, b):
            return c
        c.append(self.reduce_min_sep(universe, a, b))
        processed: set[frozenset] = set()
        while True:
            progressed = False
            for d in minimal_transversals(c):
                self.deadline.check()
                if d in processed:
                    continue
                processed.add(d)
                comp = universe - d
                if self.separates(comp, a, b):
                    x = self.reduce_min_sep(comp, a, b)
                    if x not in c:
                        c.append(x)
                        progressed = True
                        break
            if not progressed:
                return c

    # ------------------------------------------------------------------
    # MVDMiner main loop (Fig 3)
    # ------------------------------------------------------------------
    def mine(
        self,
        pairs: Sequence[tuple[str, str]] | None = None,
        *,
        minseps_only: bool = False,
    ) -> MinerResult:
        """Run the full miner; returns partial results on deadline."""
        t0 = time.monotonic()
        res = MinerResult(epsilon=self.eps)
        if pairs is None:
            pairs = list(combinations(sorted(self.engine.columns), 2))
        seen: set[MVD] = set()
        try:
            for a, b in pairs:
                sink: list[frozenset] = []
                res.minseps[(a, b)] = sink
                self.mine_min_seps(a, b, sink=sink)
                if minseps_only:
                    continue
                for x in sink:
                    for m in self.get_full_mvds(x, (a, b)):
                        if m not in seen:
                            seen.add(m)
                            res.full_mvds.append(m)
        except DeadlineReached:
            res.timed_out = True
        res.elapsed = time.monotonic() - t0
        res.stats = {
            "nodes_explored": self.nodes_explored,
            **self.engine.cache_info(),
        }
        return res


def _separated(parts: _Node, pair: tuple[str, str]) -> bool:
    a, b = pair
    return not any(a in p and b in p for p in parts)
