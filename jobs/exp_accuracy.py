"""spark-submit entrypoint for the accuracy experiment (Fig 12)."""
import sys

sys.path.insert(0, ".")

from jobs._session import get_spark  # noqa: E402
from repro.experiments.accuracy import run_accuracy  # noqa: E402
from repro.experiments.common import to_markdown  # noqa: E402


def run(spark, rows_cap: int = 800):
    return run_accuracy(spark, rows_cap=rows_cap)


if __name__ == "__main__":
    spark = get_spark("accuracy")
    rows_cap = int(sys.argv[1]) if len(sys.argv) > 1 else 800
    print(to_markdown(run(spark, rows_cap)))
    spark.stop()
