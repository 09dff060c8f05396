"""spark-submit entrypoint for schema quality (Fig 15)."""
import sys

sys.path.insert(0, ".")

from jobs._session import get_spark  # noqa: E402
from repro.experiments.common import spark_engine_factory, to_markdown  # noqa: E402
from repro.experiments.quality import run_quality  # noqa: E402


def run(spark, rows_cap: int = 1_000):
    return run_quality(rows_cap=rows_cap, engine_factory=spark_engine_factory(spark))


if __name__ == "__main__":
    spark = get_spark("quality")
    rows_cap = int(sys.argv[1]) if len(sys.argv) > 1 else 1_000
    print(to_markdown(run(spark, rows_cap)))
    spark.stop()
