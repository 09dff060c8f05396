"""Benchmark: Fig 15 — quality of approximate schemas per threshold.
Writes results/quality.md."""
from repro.experiments.common import to_markdown
from repro.experiments.quality import run_quality


def test_bench_quality(benchmark):
    df = benchmark.pedantic(
        lambda: run_quality(
            rows_cap=1_000, mine_deadline_s=10.0, enum_deadline_s=5.0
        ),
        rounds=1,
        iterations=1,
    )
    print("\n" + to_markdown(df))
    assert len(df) == 4 * 6
    # Fig 15 shape: raising the threshold does not shrink the maximum
    # degree of decomposition and does not grow the minimum width.
    for name, grp in df.groupby("dataset"):
        grp = grp.sort_values("eps")
        assert grp["max_relations"].iloc[-1] >= grp["max_relations"].iloc[0]
        assert grp["min_width"].iloc[-1] <= grp["min_width"].iloc[0]
