"""Spark entropy engines vs the local reference, plus the DuckDB oracle
check of the Eq. (5) aggregation query itself."""
import pytest

from repro.entropy.local_pli import LocalPLIEngine
from repro.entropy.spark_groupby import SparkGroupByEntropyEngine
from repro.entropy.spark_pli import SparkPLIEntropyEngine
from repro.oracle import assert_equivalent
from tests.helpers import random_relation

QUERIES = ["A", "B", "AB", "CD", "ABC", "ACD", "ABCD"]


@pytest.fixture(scope="module")
def data(spark):
    pdf = random_relation(300, "ABCD", 3, 42)
    df = spark.createDataFrame(pdf)
    df.persist()
    df.count()
    yield pdf, df
    df.unpersist()


@pytest.fixture(scope="module")
def gb_engine(data):
    _, df = data
    eng = SparkGroupByEntropyEngine(df)
    yield eng
    eng.close()


@pytest.fixture(scope="module")
def pli_engine(data):
    _, df = data
    eng = SparkPLIEntropyEngine(df, block_size=2, max_persisted=32)
    yield eng
    eng.close()


@pytest.mark.parametrize("cols", QUERIES)
def test_groupby_engine_matches_local(data, gb_engine, cols):
    pdf, _ = data
    local = LocalPLIEngine(pdf)
    assert gb_engine.entropy(cols) == pytest.approx(local.entropy(cols), abs=1e-9)


@pytest.mark.parametrize("cols", ["A", "AB", "ABC", "ABCD", "BD"])
def test_spark_pli_engine_matches_local(data, pli_engine, cols):
    """The CNT/TID dataflow (Sec. 6.3) must agree with direct Eq. (5),
    across blocks (block_size=2 forces cross-block composition)."""
    pdf, _ = data
    local = LocalPLIEngine(pdf)
    assert pli_engine.entropy(cols) == pytest.approx(local.entropy(cols), abs=1e-9)


def test_from_spark_equals_from_pandas(data):
    pdf, df = data
    a = LocalPLIEngine.from_spark(df)
    b = LocalPLIEngine(pdf)
    for cols in ["AB", "ABCD"]:
        assert a.entropy(cols) == pytest.approx(b.entropy(cols), abs=1e-9)


def test_groupby_aggregation_oracle(spark, data):
    """The grouped count*log2(count) frame -- the paper's SQL query --
    checked row-by-row against DuckDB."""
    from pyspark.sql import functions as F

    pdf, df = data
    got = (
        df.groupBy("A", "B")
        .agg(F.count(F.lit(1)).alias("cnt"))
        .select(
            F.col("A").alias("a"),
            F.col("B").alias("b"),
            (F.col("cnt") * F.log2(F.col("cnt"))).alias("clogc"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT A AS a, B AS b,
               count(*) * log2(count(*)) AS clogc
        FROM r GROUP BY A, B
        """,
        r=pdf,
    )


def test_spark_pli_tid_tables_prune_singletons(spark, pli_engine):
    """Every base TID table only contains values occurring >= 2 times."""
    t = pli_engine.tid_table(["A"])
    counts = t.groupBy("val").count().toPandas()
    assert (counts["count"] >= 2).all()


def test_entropy_stats_track_cache(gb_engine):
    before = gb_engine.entropy_computations
    gb_engine.entropy("AB")
    gb_engine.entropy("BA")
    assert gb_engine.entropy_computations <= before + 1
