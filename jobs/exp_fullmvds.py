"""spark-submit entrypoint for the full-MVD generation experiment (Fig 18)."""
import sys

sys.path.insert(0, ".")

from jobs._session import get_spark  # noqa: E402
from repro.experiments.common import spark_engine_factory, to_markdown  # noqa: E402
from repro.experiments.fullmvds import run_fullmvds  # noqa: E402


def run(spark, rows_cap: int = 400):
    return run_fullmvds(rows_cap=rows_cap, engine_factory=spark_engine_factory(spark))


if __name__ == "__main__":
    spark = get_spark("fullmvds")
    rows_cap = int(sys.argv[1]) if len(sys.argv) > 1 else 400
    print(to_markdown(run(spark, rows_cap)))
    spark.stop()
