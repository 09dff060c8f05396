"""Minimal hypergraph transversals vs exhaustive enumeration."""
from itertools import combinations

import numpy as np
import pytest

from repro.hypergraph.transversal import is_transversal, minimal_transversals


def brute_minimal_transversals(sets, universe):
    all_tr = [
        frozenset(c)
        for r in range(len(universe) + 1)
        for c in combinations(sorted(universe), r)
        if is_transversal(frozenset(c), sets)
    ]
    return sorted(
        (t for t in all_tr if not any(o < t for o in all_tr)),
        key=lambda t: (len(t), tuple(sorted(t))),
    )


def test_empty_family():
    assert minimal_transversals([]) == [frozenset()]


def test_family_with_empty_set_has_no_transversal():
    assert minimal_transversals([frozenset("A"), frozenset()]) == []


def test_single_set():
    out = minimal_transversals([frozenset("ABC")])
    assert out == [frozenset("A"), frozenset("B"), frozenset("C")]


def test_disjoint_sets_product():
    out = minimal_transversals([frozenset("AB"), frozenset("CD")])
    assert set(out) == {
        frozenset("AC"), frozenset("AD"), frozenset("BC"), frozenset("BD")
    }


def test_nested_sets_collapse():
    # {A} must be hit, {AB} then comes free.
    out = minimal_transversals([frozenset("A"), frozenset("AB")])
    assert out == [frozenset("A")]


def test_classic_triangle():
    sets = [frozenset("AB"), frozenset("BC"), frozenset("AC")]
    out = set(minimal_transversals(sets))
    assert out == {frozenset("AB"), frozenset("BC"), frozenset("AC")}


def test_duplicate_sets_handled():
    out = minimal_transversals([frozenset("AB"), frozenset("AB")])
    assert out == [frozenset("A"), frozenset("B")]


def test_is_transversal():
    sets = [frozenset("AB"), frozenset("CD")]
    assert is_transversal(frozenset("AC"), sets)
    assert not is_transversal(frozenset("A"), sets)
    assert is_transversal(frozenset("ABCD"), sets)
    assert is_transversal(frozenset(), [])


@pytest.mark.parametrize("seed", range(12))
def test_matches_brute_force_random(seed):
    rng = np.random.default_rng(seed)
    universe = list("ABCDEF")
    n_sets = int(rng.integers(1, 6))
    sets = []
    for _ in range(n_sets):
        size = int(rng.integers(1, 4))
        sets.append(frozenset(rng.choice(universe, size, replace=False).tolist()))
    got = minimal_transversals(sets)
    want = brute_minimal_transversals(sets, universe)
    assert got == want
    # every output really is a minimal transversal
    for t in got:
        assert is_transversal(t, sets)
        for x in t:
            assert not is_transversal(t - {x}, sets)
