"""Unit tests for the EntropyEngine base layer and shared helpers."""
import math
from itertools import combinations

import pytest

from repro.entropy.base import entropy_from_group_sizes
from tests.helpers import engine_of, random_relation


def test_entropy_from_group_sizes_uniform():
    # 4 groups of size 2 over 8 rows: H = log2 8 - 8*1/8 = 2 bits.
    assert entropy_from_group_sizes([2, 2, 2, 2], 8) == pytest.approx(2.0)


def test_entropy_from_group_sizes_singletons_ignored():
    assert entropy_from_group_sizes([1, 1, 1, 1], 4) == pytest.approx(2.0)
    assert entropy_from_group_sizes([], 4) == pytest.approx(2.0)


def test_entropy_from_group_sizes_single_group():
    assert entropy_from_group_sizes([5], 5) == pytest.approx(0.0)


def test_entropy_from_group_sizes_empty_relation():
    assert entropy_from_group_sizes([], 0) == 0.0


def test_empty_set_entropy_is_zero():
    eng = engine_of(random_relation(50, "ABC", 3, 0))
    assert eng.entropy(()) == 0.0
    assert eng.entropy(frozenset()) == 0.0


def test_unknown_column_raises():
    eng = engine_of(random_relation(10, "AB", 2, 0))
    with pytest.raises(KeyError):
        eng.entropy("AZ")


def test_duplicate_columns_rejected():
    import pandas as pd

    from repro.entropy.local_pli import LocalPLIEngine

    pdf = random_relation(5, "AB", 2, 0)
    with pytest.raises(ValueError):
        LocalPLIEngine(pdf, columns=["A", "A"])


def test_cache_hits_do_not_recompute():
    eng = engine_of(random_relation(100, "ABCD", 3, 1))
    eng.entropy("AB")
    n = eng.entropy_computations
    eng.entropy("BA")  # same frozenset
    eng.entropy(frozenset("AB"))
    assert eng.entropy_computations == n
    assert eng.entropy_calls >= 3


def test_cache_info_keys():
    eng = engine_of(random_relation(10, "AB", 2, 2))
    eng.entropy("A")
    info = eng.cache_info()
    assert set(info) == {"cached", "calls", "computations"}


@pytest.mark.parametrize("seed", range(5))
def test_mutual_info_nonnegative(seed):
    eng = engine_of(random_relation(60, "ABCD", 3, seed))
    for y, z in combinations("ABCD", 2):
        x = frozenset("ABCD") - {y, z}
        assert eng.mutual_info({y}, {z}, x) >= 0.0
        assert eng.mutual_info({y}, {z}) >= 0.0


@pytest.mark.parametrize("seed", range(5))
def test_chain_rule_identity(seed):
    # I(B; CD | A) = I(B; C | A) + I(B; D | AC), Eq. (4).
    eng = engine_of(random_relation(80, "ABCD", 3, seed + 10))
    lhs = eng.mutual_info("B", "CD", "A")
    rhs = eng.mutual_info("B", "C", "A") + eng.mutual_info("B", "D", "AC")
    assert lhs == pytest.approx(rhs, abs=1e-9)


@pytest.mark.parametrize("seed", range(5))
def test_monotonicity_and_submodularity(seed):
    eng = engine_of(random_relation(70, "ABC", 4, seed + 20))
    # monotonicity H(AB) >= H(A)
    assert eng.entropy("AB") >= eng.entropy("A") - 1e-12
    assert eng.entropy("ABC") >= eng.entropy("BC") - 1e-12
    # submodularity H(AB) + H(AC) >= H(ABC) + H(A)
    assert (
        eng.entropy("AB") + eng.entropy("AC")
        >= eng.entropy("ABC") + eng.entropy("A") - 1e-9
    )


@pytest.mark.parametrize("seed", range(3))
def test_entropy_bounds(seed):
    pdf = random_relation(64, "ABCDE", 3, seed + 30)
    eng = engine_of(pdf)
    for cols in ["A", "AB", "ABCDE"]:
        h = eng.entropy(cols)
        assert 0.0 <= h <= math.log2(len(pdf)) + 1e-12


def test_j_schema_requires_acyclic():
    eng = engine_of(random_relation(20, "ABC", 2, 0))
    with pytest.raises(ValueError):
        eng.j_schema([frozenset("AB"), frozenset("BC"), frozenset("CA")])


def test_j_parts_two_deps_equals_mutual_info():
    eng = engine_of(random_relation(50, "ABCD", 3, 5))
    j = eng.j_parts(frozenset("A"), [frozenset("B"), frozenset("CD")])
    i = eng.mutual_info("B", "CD", "A")
    assert j == pytest.approx(i, abs=1e-9)
