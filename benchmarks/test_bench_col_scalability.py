"""Benchmark: Fig 14 — minimal separators found vs #columns under a
fixed per-run time limit. Writes results/col_scalability.md."""
from repro.experiments.col_scalability import run_col_scalability
from repro.experiments.common import to_markdown


def test_bench_col_scalability(benchmark):
    df = benchmark.pedantic(
        lambda: run_col_scalability(rows_cap=2_000, per_run_timeout_s=12.0),
        rounds=1,
        iterations=1,
    )
    print("\n" + to_markdown(df))
    assert len(df) == 2 * 4 * 3
    # Fig 14 shape: the widest configurations hit the time limit (the
    # paper's Voter State / Reflns behaviour) while narrow ones finish.
    widest = df[df["frac"] == 1.0]
    assert (widest["runtime_s"] == "TL").any()
    narrowest = df[df["frac"] == 0.25]
    assert (narrowest["runtime_s"] != "TL").any()
