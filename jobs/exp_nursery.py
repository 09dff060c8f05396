"""spark-submit entrypoint for the Nursery use case (Figs 10-11)."""
import sys

sys.path.insert(0, ".")

from jobs._session import get_spark  # noqa: E402
from repro.experiments.common import to_markdown  # noqa: E402
from repro.experiments.nursery_usecase import run_nursery  # noqa: E402


def run(spark, quality_cap: int = 40):
    return run_nursery(spark, quality_cap=quality_cap)


if __name__ == "__main__":
    spark = get_spark("nursery")
    cap = int(sys.argv[1]) if len(sys.argv) > 1 else 40
    schemes, pareto = run(spark, cap)
    print("All schemes:\n" + to_markdown(schemes))
    print("\nPareto front:\n" + to_markdown(pareto))
    spark.stop()
