"""Unit tests for the canonical MVD model (Sec. 3.1, 5.2)."""
import pytest

from repro.core.mvd import MVD


def test_canonicalization_equality():
    m1 = MVD.of("A", ["BC", "D"])
    m2 = MVD.of(frozenset("A"), [frozenset("D"), frozenset("CB")])
    assert m1 == m2
    assert hash(m1) == hash(m2)


def test_requires_two_dependents():
    with pytest.raises(ValueError):
        MVD.of("A", ["BC"])


def test_rejects_empty_dependent():
    with pytest.raises(ValueError):
        MVD.of("A", ["B", ""])


def test_rejects_key_overlap():
    with pytest.raises(ValueError):
        MVD.of("AB", ["BC", "D"])


def test_rejects_overlapping_dependents():
    with pytest.raises(ValueError):
        MVD.of("A", ["BC", "CD"])


def test_attributes_and_ndeps():
    m = MVD.of("X", ["AB", "C", "D"])
    assert m.attributes == frozenset("XABCD")
    assert m.n_deps == 3


def test_dep_of():
    m = MVD.of("X", ["AB", "C"])
    assert m.dep_of("A") == frozenset("AB")
    assert m.dep_of("C") == frozenset("C")
    assert m.dep_of("X") is None
    assert m.dep_of("Z") is None


def test_separates():
    m = MVD.of("X", ["AB", "C"])
    assert m.separates("A", "C")
    assert not m.separates("A", "B")
    assert not m.separates("X", "C")  # key attr is in no dependent


def test_refines_basic():
    fine = MVD.of("X", ["A", "B", "C"])
    coarse = MVD.of("X", ["AB", "C"])
    assert fine.refines(coarse)
    assert fine.strictly_refines(coarse)
    assert not coarse.refines(fine)
    assert coarse.refines(coarse) and not coarse.strictly_refines(coarse)


def test_refines_requires_same_key():
    assert not MVD.of("X", ["A", "B"]).refines(MVD.of("Y", ["A", "B"]))


def test_refines_incomparable():
    m1 = MVD.of("X", ["AB", "CD"])
    m2 = MVD.of("X", ["AC", "BD"])
    assert not m1.refines(m2) and not m2.refines(m1)


def test_join_refines_both():
    m1 = MVD.of("X", ["AB", "CD"])
    m2 = MVD.of("X", ["AC", "BD"])
    j = m1.join(m2)
    assert j == MVD.of("X", ["A", "B", "C", "D"])
    assert j.refines(m1) and j.refines(m2)


def test_join_drops_empty_intersections():
    m1 = MVD.of("X", ["AB", "C"])
    m2 = MVD.of("X", ["A", "BC"])
    assert m1.join(m2) == MVD.of("X", ["A", "B", "C"])


def test_join_requires_same_key():
    with pytest.raises(ValueError):
        MVD.of("X", ["A", "B"]).join(MVD.of("Y", ["A", "B"]))


def test_merge():
    m = MVD.of("X", ["A", "B", "C"])
    merged = {m.merge(i, j) for i in range(3) for j in range(3) if i != j}
    assert merged == {
        MVD.of("X", ["AB", "C"]),
        MVD.of("X", ["AC", "B"]),
        MVD.of("X", ["BC", "A"]),
    }
    with pytest.raises(ValueError):
        m.merge(1, 1)


def test_merge_then_refines():
    m = MVD.of("X", ["A", "B", "C", "D"])
    assert m.refines(m.merge(0, 1))
    assert m.merge(0, 1).refines(m.merge(0, 1))


def test_str_roundtrippable_labels():
    assert str(MVD.of("X", ["A", "BC"])) == "X ->> A|BC"
    assert str(MVD.of("", ["A", "B"])) == "{} ->> A|B"


def test_empty_key_allowed():
    m = MVD.of("", ["A", "B"])
    assert m.key == frozenset()
    assert m.separates("A", "B")
