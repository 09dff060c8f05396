"""Schema quality metrics via Spark joins, with DuckDB oracle checks."""
import pandas as pd
import pytest

from repro.core.quality import (
    acyclic_join,
    cell_savings_pct,
    schema_report,
    spurious_pct,
)
from repro.oracle import assert_equivalent
from tests.helpers import exact_jd_relation
from repro import datasets

BAGS = [frozenset(b) for b in ("ABD", "ACD", "BDE", "AF")]


@pytest.fixture(scope="module")
def exact_df(spark):
    df = spark.createDataFrame(exact_jd_relation())
    df.persist()
    df.count()
    yield df
    df.unpersist()


def test_exact_schema_zero_spurious(exact_df):
    assert spurious_pct(exact_df, BAGS) == pytest.approx(0.0)


def test_spurious_after_violation(spark):
    pdf = exact_jd_relation()
    pdf.loc[len(pdf)] = ["a1", "b3", "c1", "d1", "e1", "f1"]
    df = spark.createDataFrame(pdf)
    # (a1,d1) group now joins B in {b1,b2,b3} x C in {c1,c2} = 6 rows,
    # relation has 5 -> 1 spurious tuple = 20%.
    assert spurious_pct(df, BAGS) == pytest.approx(20.0)


def test_acyclic_join_matches_duckdb(spark):
    pdf = exact_jd_relation()
    pdf.loc[len(pdf)] = ["a1", "b3", "c1", "d1", "e1", "f1"]
    df = spark.createDataFrame(pdf)
    joined = acyclic_join(df, BAGS).select(*sorted("ABCDEF"))
    assert_equivalent(
        joined,
        """
        SELECT r1.A AS A, r1.B AS B, r2.C AS C, r1.D AS D, r3.E AS E, r4.F AS F
        FROM (SELECT DISTINCT A, B, D FROM r) r1
        JOIN (SELECT DISTINCT A, C, D FROM r) r2 ON r1.A = r2.A AND r1.D = r2.D
        JOIN (SELECT DISTINCT B, D, E FROM r) r3 ON r1.B = r3.B AND r1.D = r3.D
        JOIN (SELECT DISTINCT A, F FROM r) r4 ON r1.A = r4.A
        """,
        r=pdf,
    )


def test_cyclic_schema_rejected(exact_df):
    with pytest.raises(ValueError):
        acyclic_join(exact_df, [frozenset("AB"), frozenset("BC"), frozenset("CA")])


def test_cell_savings_manual(spark):
    # R: 4 rows x 3 cols = 12 cells. Bags AB (2 distinct rows x 2 cols)
    # and BC (4 x 2) -> 4 + 8 = 12 cells -> savings 0%.
    pdf = pd.DataFrame(
        {"A": [0, 0, 1, 1], "B": [0, 0, 1, 1], "C": [0, 1, 0, 1]}
    )
    df = spark.createDataFrame(pdf)
    s = cell_savings_pct(df, [frozenset("AB"), frozenset("BC")])
    assert s == pytest.approx(100.0 * (12 - (2 * 2 + 4 * 2)) / 12)


def test_savings_positive_for_real_decomposition(exact_df):
    assert cell_savings_pct(exact_df, BAGS) > 0.0


def test_schema_report_keys(exact_df):
    rep = schema_report(exact_df, BAGS)
    assert rep["n_relations"] == 4
    assert rep["width"] == 3
    assert rep["int_width"] == 2
    assert rep["spurious_pct"] == pytest.approx(0.0)
    assert rep["savings_pct"] == pytest.approx(
        cell_savings_pct(exact_df, BAGS)
    )


def test_disjoint_bags_cross_join(spark):
    pdf = pd.DataFrame({"A": [0, 1], "B": [0, 1]})
    df = spark.createDataFrame(pdf)
    joined = acyclic_join(df, [frozenset("A"), frozenset("B")])
    assert joined.count() == 4  # 2 x 2 cross product
    assert spurious_pct(df, [frozenset("A"), frozenset("B")]) == pytest.approx(100.0)


def test_planted_schema_low_spurious(spark):
    """A planted noise-free relation decomposes with 0 spurious tuples
    under a schema the miner finds at eps=0."""
    from repro.core.miner import MVDMiner
    from repro.core.schema_miner import enumerate_schemas
    from repro.entropy.local_pli import LocalPLIEngine

    pdf = datasets.planted_relation(6, 150, seed=4, noise=0.0)
    engine = LocalPLIEngine(pdf)
    res = MVDMiner(engine, 0.0).mine()
    schemas = list(enumerate_schemas(res.full_mvds, engine.columns, max_schemas=3))
    assert schemas, "planted data must yield at least one exact schema"
    df = spark.createDataFrame(pdf)
    for s in schemas:
        assert spurious_pct(df, list(s.bags)) == pytest.approx(0.0, abs=1e-9)
