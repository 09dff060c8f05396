"""Schema quality metrics used by the evaluation (Sec. 8.1, 8.2, 8.4).

- ``spurious_pct``: E = (|join of bag projections| - |R|) / |R| * 100.
  The acyclic join is executed as Spark DataFrame joins along the join
  tree (distinct bag projections, natural-joined parent-to-child), so
  Catalyst runs the same dataflow Yannakakis-style evaluation would.
- ``cell_savings_pct``: S = (cells(R) - sum cells(R[bag])) / cells(R),
  with cells = #rows * #columns of the distinct projections (Sec. 8.1).
- ``schema_width`` / ``schema_int_width`` / #relations (Sec. 8.4) live
  in :mod:`repro.core.jointree`.
"""
from __future__ import annotations

from typing import Iterable, Sequence

from pyspark.sql import DataFrame

from repro.core.jointree import JoinTree, build_join_tree


def _tree_join(df: DataFrame, tree: JoinTree) -> DataFrame:
    """Natural join of distinct bag projections along the join tree.

    Joining in BFS tree order guarantees every join's key is exactly the
    edge separator (running intersection), so no cross product appears
    unless an edge separator is empty (attribute-disjoint components).
    """
    projections = [df.select(*sorted(bag)).distinct() for bag in tree.bags]
    n = len(tree.bags)
    adj: dict[int, list[int]] = {i: [] for i in range(n)}
    for u, v in tree.edges:
        adj[u].append(v)
        adj[v].append(u)
    visited = {0}
    order = [0]
    stack = [0]
    while stack:
        u = stack.pop()
        for w in adj[u]:
            if w not in visited:
                visited.add(w)
                order.append(w)
                stack.append(w)
    # A join tree built by build_join_tree is connected (empty-separator
    # edges connect attribute-disjoint components), so order covers all.
    joined = projections[order[0]]
    acc_cols = set(tree.bags[order[0]])
    for idx in order[1:]:
        common = sorted(acc_cols & set(tree.bags[idx]))
        if common:
            joined = joined.join(projections[idx], on=common, how="inner")
        else:
            joined = joined.crossJoin(projections[idx])
        acc_cols |= set(tree.bags[idx])
    return joined


def acyclic_join(df: DataFrame, bags: Iterable[Iterable[str]]) -> DataFrame:
    """The full join of the schema's projections, R[bag1] |><| ... ."""
    tree = build_join_tree(bags)
    if tree is None:
        raise ValueError("schema is not acyclic")
    return _tree_join(df, tree)


def spurious_pct(df: DataFrame, bags: Iterable[Iterable[str]], n_rows: int | None = None) -> float:
    """Percentage of spurious tuples E of the decomposition (Sec. 8.1).

    ``df`` is treated as a set of tuples (the paper's relations are
    sets); duplicates are dropped before counting.
    """
    if n_rows is None:
        n_rows = df.distinct().count()
    join_count = acyclic_join(df, bags).count()
    return 100.0 * (join_count - n_rows) / n_rows


def cell_savings_pct(df: DataFrame, bags: Iterable[Iterable[str]], n_rows: int | None = None) -> float:
    """Percentage of cells saved by storing projections instead of R."""
    bags = [frozenset(b) for b in bags]
    if n_rows is None:
        n_rows = df.count()
    n_cols = len(df.columns)
    orig = n_rows * n_cols
    dec = sum(df.select(*sorted(b)).distinct().count() * len(b) for b in bags)
    return 100.0 * (orig - dec) / orig


def schema_report(
    df: DataFrame, bags: Sequence[frozenset], n_rows: int | None = None
) -> dict:
    """E, S, width, intWidth, #relations for one schema (Fig 10 row)."""
    from repro.core.jointree import schema_int_width, schema_width

    if n_rows is None:
        n_rows = df.distinct().count()
    return {
        "n_relations": len(bags),
        "width": schema_width(bags),
        "int_width": schema_int_width(bags),
        "spurious_pct": spurious_pct(df, bags, n_rows),
        "savings_pct": cell_savings_pct(df, bags, n_rows),
    }
