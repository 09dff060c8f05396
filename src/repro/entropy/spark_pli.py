"""Faithful Spark-DataFrame port of the paper's getEntropy (Sec. 6.3).

The paper materializes, per attribute set ``alpha``, two main-memory H2
tables::

    CNT_alpha(val, cnt)  -- value group sizes, singletons pruned
    TID_alpha(val, tid)  -- value -> tuple-id map, restricted to CNT vals

and composes ``alpha U beta`` by joining ``TID_alpha`` with ``TID_beta``
on ``tid`` then re-grouping. We keep the identical dataflow but as
Catalyst DataFrame jobs: base TID tables per attribute, composition =
equi-join on ``tid`` + ``groupBy(val)`` + ``HAVING count > 1`` + semi
join, and the block-partitioned lattice cache of the paper (parameter
``L``): TID tables for subsets *within* a block of ``L`` attributes are
persisted lazily; cross-block subsets are composed on the fly.

Values are composed by string concatenation with an unprintable
separator instead of the paper's DB hash -- exact rather than
probabilistic, at the cost of longer keys (irrelevant at our scales).
"""
from __future__ import annotations

from typing import Iterable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.entropy.base import EntropyEngine

_SEP = "\x1f"


class SparkPLIEntropyEngine(EntropyEngine):
    """Entropy oracle via singleton-pruned TID tables in Spark DataFrames."""

    def __init__(
        self,
        df: DataFrame,
        columns: Iterable[str] | None = None,
        *,
        block_size: int = 5,
        max_persisted: int = 128,
    ):
        cols = tuple(columns) if columns is not None else tuple(df.columns)
        base = df.select(*cols).withColumn("tid", F.monotonically_increasing_id())
        # Materialize tids once so every derived table sees the same ids.
        base.persist()
        n = base.count()
        super().__init__(cols, n)
        self._base = base
        self._order = {c: i for i, c in enumerate(cols)}
        self.block_size = int(block_size)
        self._block_of = {c: i // self.block_size for i, c in enumerate(cols)}
        self._tid_cache: dict[tuple, DataFrame] = {}
        self._max_persisted = max_persisted

    # -- TID construction ----------------------------------------------
    def _key(self, cols: Iterable[str]) -> tuple:
        return tuple(sorted(cols, key=self._order.__getitem__))

    def _base_tid(self, col: str) -> DataFrame:
        t = self._base.select(
            F.col(col).cast("string").alias("val"), F.col("tid")
        )
        good = (
            t.groupBy("val")
            .agg(F.count(F.lit(1)).alias("cnt"))
            .where(F.col("cnt") > 1)
            .select("val")
        )
        return t.join(good, "val", "left_semi")

    @staticmethod
    def _compose(a: DataFrame, b: DataFrame) -> DataFrame:
        """TID table of the union of two disjoint attribute sets.

        SELECT concat(a.val, b.val) AS val, a.tid
        FROM tid_a a JOIN tid_b b ON a.tid = b.tid
        ... keeping only vals WITH count(*) > 1 (singleton pruning).
        """
        joined = (
            a.alias("a")
            .join(b.alias("b"), F.col("a.tid") == F.col("b.tid"))
            .select(
                F.concat_ws(_SEP, F.col("a.val"), F.col("b.val")).alias("val"),
                F.col("a.tid").alias("tid"),
            )
        )
        good = (
            joined.groupBy("val")
            .agg(F.count(F.lit(1)).alias("cnt"))
            .where(F.col("cnt") > 1)
            .select("val")
        )
        return joined.join(good, "val", "left_semi")

    def _block_tid(self, key: tuple) -> DataFrame:
        """TID for a subset living inside one block; persisted lazily,
        with every prefix cached (the in-block lattice)."""
        hit = self._tid_cache.get(key)
        if hit is not None:
            return hit
        if len(key) == 1:
            t = self._base_tid(key[0])
        else:
            t = self._compose(self._block_tid(key[:-1]), self._base_tid(key[-1]))
        if len(self._tid_cache) < self._max_persisted:
            t.persist()
            self._tid_cache[key] = t
        return t

    def tid_table(self, cols: Iterable[str]) -> DataFrame:
        """TID table for an arbitrary attribute set (cross-block compose)."""
        key = self._key(cols)
        if not key:
            raise ValueError("empty attribute set")
        pieces: dict[int, list[str]] = {}
        for c in key:
            pieces.setdefault(self._block_of[c], []).append(c)
        tids = [self._block_tid(tuple(p)) for _, p in sorted(pieces.items())]
        cur = tids[0]
        for nxt in tids[1:]:
            cur = self._compose(cur, nxt)
        return cur

    # -- oracle ---------------------------------------------------------
    def _entropy(self, cols: frozenset) -> float:
        cnt = (
            self.tid_table(cols)
            .groupBy("val")
            .agg(F.count(F.lit(1)).alias("cnt"))
        )
        row = cnt.agg(F.sum(F.col("cnt") * F.log2(F.col("cnt"))).alias("s")).first()
        s = row["s"] or 0.0
        return max(0.0, self.log2_n - s / self.n_rows)

    def close(self) -> None:
        for t in self._tid_cache.values():
            t.unpersist()
        self._tid_cache.clear()
        self._base.unpersist()
