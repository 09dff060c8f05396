"""ASMiner: compatibility (Def 7.1), BuildAcyclicSchema (Fig 9), and the
end-to-end schema enumeration (Fig 8)."""
import pytest

from repro.core.jointree import build_join_tree, support_mvds
from repro.core.miner import MVDMiner
from repro.core.mvd import MVD
from repro.core.schema_miner import (
    build_acyclic_schema,
    compatible,
    enumerate_schemas,
)
from repro.entropy.local_pli import LocalPLIEngine
from tests.helpers import random_relation


def fs(*names):
    return [frozenset(n) for n in names]


# ---------------------------------------------------------------------------
# compatibility (Def. 7.1 / Theorem 7.2)
# ---------------------------------------------------------------------------
def test_path_tree_support_compatible():
    t = build_join_tree(fs("AB", "BC", "CD"))
    sup = support_mvds(t)
    for i in range(len(sup)):
        for j in range(i + 1, len(sup)):
            assert compatible(sup[i], sup[j])


def test_paper_tree_support_compatible():
    t = build_join_tree(fs("ABD", "ACD", "BDE", "AF"))
    sup = support_mvds(t)
    assert len(sup) == 3
    for i in range(len(sup)):
        for j in range(i + 1, len(sup)):
            assert compatible(sup[i], sup[j]), (str(sup[i]), str(sup[j]))


@pytest.mark.parametrize("seed", range(8))
def test_theorem72_random_trees(seed):
    """The support of any join tree is pairwise compatible."""
    import numpy as np

    from repro.datasets import attr_names, random_tree_schema

    rng = np.random.default_rng(seed + 7)
    schema = random_tree_schema(attr_names(9), rng)
    t = build_join_tree([b for b, _ in schema])
    sup = support_mvds(t)
    for i in range(len(sup)):
        for j in range(i + 1, len(sup)):
            assert compatible(sup[i], sup[j]), (str(sup[i]), str(sup[j]))


def test_incompatible_crossing_mvds():
    # X ->> A|BC and A ->> X|BC over {X,A,B,C}: the second key A is not
    # contained in X union a single dependent side in a split-free way
    # with two-block crossings on both sides.
    phi = MVD.of("X", ["AB", "C"])
    psi = MVD.of("C", ["A", "BX"])
    # phi, psi cannot be the support of one join tree: verify the
    # definition's verdict is symmetric at least.
    assert compatible(phi, psi) == compatible(psi, phi)


def test_compatibility_symmetry_random():
    import numpy as np

    rng = np.random.default_rng(3)
    attrs = list("ABCDE")
    for _ in range(30):
        k1 = frozenset(rng.choice(attrs, rng.integers(0, 2), replace=False))
        rest1 = [a for a in attrs if a not in k1]
        cut = rng.integers(1, len(rest1))
        phi = MVD.of(k1, [rest1[:cut], rest1[cut:]])
        k2 = frozenset(rng.choice(attrs, rng.integers(0, 2), replace=False))
        rest2 = [a for a in attrs if a not in k2]
        cut2 = rng.integers(1, len(rest2))
        psi = MVD.of(k2, [rest2[:cut2], rest2[cut2:]])
        assert compatible(phi, psi) == compatible(psi, phi)


# ---------------------------------------------------------------------------
# BuildAcyclicSchema (Fig 9)
# ---------------------------------------------------------------------------
def test_build_from_paper_support():
    t = build_join_tree(fs("ABD", "ACD", "BDE", "AF"))
    sup = support_mvds(t)
    bags = build_acyclic_schema(sup, "ABCDEF")
    assert set(bags) == {
        frozenset("ABD"), frozenset("ACD"), frozenset("BDE"), frozenset("AF")
    }


def test_build_single_mvd():
    bags = build_acyclic_schema([MVD.of("X", ["A", "B"])], "XAB")
    assert set(bags) == {frozenset("XA"), frozenset("XB")}


def test_build_multi_dependent_mvd():
    bags = build_acyclic_schema([MVD.of("X", ["A", "B", "C"])], "XABC")
    assert set(bags) == {frozenset("XA"), frozenset("XB"), frozenset("XC")}


def test_redundant_mvd_skipped():
    # After X ->> A|BC splits {XABC} into {XA, XBC}, the MVD
    # XBC ->> nothing-to-split is redundant; schema unchanged.
    q = [MVD.of("X", ["A", "BC"])]
    bags1 = build_acyclic_schema(q, "XABC")
    q2 = q + [MVD.of("XA", ["B", "C"])]  # key XA inside no single bag? XA in XA bag only; splits nothing there
    bags2 = build_acyclic_schema(q2, "XABC")
    assert set(bags1) == {frozenset("XA"), frozenset("XBC")}
    assert set(bags2) >= {frozenset("XA")}


def test_build_result_always_acyclic():
    import numpy as np

    rng = np.random.default_rng(11)
    for seed in range(10):
        pdf = random_relation(30, "ABCDE", 2, seed + 60)
        res = MVDMiner(LocalPLIEngine(pdf), 0.4).mine()
        for schema in enumerate_schemas(res.full_mvds, "ABCDE", max_schemas=10):
            assert build_join_tree(schema.bags) is not None


@pytest.mark.parametrize("seed", range(6))
def test_theorem74_support_subset_of_q(seed):
    """The synthesized schema's join-tree support is contained in Q up
    to coarsening: every support MVD of the built tree must be implied
    by (have J bounded by) the set Q -- we check the structural half:
    each tree separator appears as a key in Q."""
    pdf = random_relation(40, "ABCDE", 2, seed + 80)
    res = MVDMiner(LocalPLIEngine(pdf), 0.4).mine()
    for schema in enumerate_schemas(res.full_mvds, "ABCDE", max_schemas=5):
        keys = {m.key for m in schema.support}
        for sep in schema.tree.separators():
            assert sep in keys or any(sep <= k for k in keys)


# ---------------------------------------------------------------------------
# enumerate_schemas (Fig 8)
# ---------------------------------------------------------------------------
def test_enumeration_deduplicates():
    pdf = random_relation(30, "ABCD", 2, 5)
    res = MVDMiner(LocalPLIEngine(pdf), 0.5).mine()
    schemas = list(enumerate_schemas(res.full_mvds, "ABCD"))
    assert len({s.bags for s in schemas}) == len(schemas)


def test_max_schemas_cap():
    pdf = random_relation(30, "ABCDE", 2, 6)
    res = MVDMiner(LocalPLIEngine(pdf), 0.5).mine()
    assert len(list(enumerate_schemas(res.full_mvds, "ABCDE", max_schemas=3))) <= 3


def test_supports_are_pairwise_compatible():
    pdf = random_relation(30, "ABCDE", 2, 7)
    res = MVDMiner(LocalPLIEngine(pdf), 0.4).mine()
    for schema in enumerate_schemas(res.full_mvds, "ABCDE", max_schemas=10):
        q = schema.support
        for i in range(len(q)):
            for j in range(i + 1, len(q)):
                assert compatible(q[i], q[j])


def test_corollary52_j_bound():
    """Every enumerated schema S with m relations built from eps-MVDs
    satisfies J(S) <= (m-1) * eps (Cor. 5.2 / Sec. 4)."""
    eps = 0.3
    pdf = random_relation(40, "ABCDE", 2, 8)
    engine = LocalPLIEngine(pdf)
    res = MVDMiner(engine, eps).mine()
    for schema in enumerate_schemas(res.full_mvds, "ABCDE", max_schemas=20):
        j = engine.j_tree(list(schema.tree.bags), list(schema.tree.edges))
        assert j <= (len(schema.bags) - 1) * eps + 1e-6


def test_empty_mvd_set_yields_nothing():
    assert list(enumerate_schemas([], "ABC")) == []


def test_deadline_stops_enumeration():
    pdf = random_relation(30, "ABCDE", 2, 9)
    res = MVDMiner(LocalPLIEngine(pdf), 0.5).mine()
    out = list(enumerate_schemas(res.full_mvds, "ABCDE", deadline_s=0.0))
    assert out == []
