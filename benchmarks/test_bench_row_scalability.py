"""Benchmark: Fig 13 — minimal-separator mining time vs #rows.
Writes results/row_scalability.md."""
import pandas as pd

from repro.experiments.common import to_markdown
from repro.experiments.row_scalability import run_row_scalability


def test_bench_row_scalability(benchmark):
    df = benchmark.pedantic(
        lambda: run_row_scalability(
            fractions=(0.1, 0.5, 1.0),
            base_rows=50_000,
            per_run_timeout_s=30.0,
        ),
        rounds=1,
        iterations=1,
    )
    print("\n" + to_markdown(df))
    assert len(df) == 3 * 3 * 3
    # Fig 13 shape: runtime grows with rows (compare 10% vs 100% at
    # eps=0 for each dataset, over completed runs).
    done = df[df["runtime_s"] != "TL"].copy()
    done["runtime_s"] = done["runtime_s"].astype(float)
    for name, grp in done[done["eps"] == 0.0].groupby("dataset"):
        grp = grp.sort_values("frac")
        if len(grp) >= 2:
            assert grp["runtime_s"].iloc[-1] >= grp["runtime_s"].iloc[0] * 0.8
