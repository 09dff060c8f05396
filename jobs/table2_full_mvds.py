"""spark-submit entrypoint for Table 2 (full MVD mining at eps=0).

Usage: spark-submit jobs/table2_full_mvds.py [rows_cap] [timeout_s]
"""
import sys

sys.path.insert(0, ".")

from jobs._session import get_spark  # noqa: E402
from repro.experiments.common import spark_engine_factory, to_markdown  # noqa: E402
from repro.experiments.table2 import run_table2  # noqa: E402


def run(spark, rows_cap: int = 2_000, timeout_s: float = 30.0):
    return run_table2(
        rows_cap=rows_cap,
        timeout_s=timeout_s,
        engine_factory=spark_engine_factory(spark),
    )


if __name__ == "__main__":
    spark = get_spark("table2")
    rows_cap = int(sys.argv[1]) if len(sys.argv) > 1 else 2_000
    timeout_s = float(sys.argv[2]) if len(sys.argv) > 2 else 30.0
    print(to_markdown(run(spark, rows_cap, timeout_s)))
    spark.stop()
