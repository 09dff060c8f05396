"""Benchmark: Fig 12 — spurious-tuple % vs J-measure buckets on four
small dataset analogs. Writes results/accuracy.md."""
from repro.experiments.accuracy import run_accuracy
from repro.experiments.common import to_markdown


def test_bench_accuracy(benchmark, spark):
    df = benchmark.pedantic(
        lambda: run_accuracy(spark, rows_cap=600, quality_cap=15),
        rounds=1,
        iterations=1,
    )
    print("\n" + to_markdown(df))
    assert len(df) >= 4
    # Fig 12 shape: within each dataset, median spurious % grows with
    # the J bucket (monotone trend over bucket medians, allowing noise:
    # last bucket >= first bucket).
    for name, grp in df.groupby("dataset"):
        grp = grp.sort_values("J_bucket")
        if len(grp) >= 2:
            assert (
                grp["spurious_median"].iloc[-1] >= grp["spurious_median"].iloc[0] - 1e-9
            )
