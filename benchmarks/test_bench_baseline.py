"""Benchmark: MVDMiner vs the exhaustive-definition baseline.

The paper has no external competitor; the baseline is the definitional
enumeration (all subsets x all partitions). This bench documents the
speedup of the minimal-separator / full-MVD search on a relation small
enough for the baseline to finish."""
import time

from repro.core.bruteforce import brute_mine
from repro.core.miner import MVDMiner
from repro.datasets import planted_relation
from repro.entropy.local_pli import LocalPLIEngine
from repro.experiments.common import write_markdown

import pandas as pd


def test_bench_miner_vs_baseline(benchmark):
    pdf = planted_relation(6, 200, seed=1, noise=0.02)

    def run_miner():
        return MVDMiner(LocalPLIEngine(pdf), 0.1).mine()

    res = benchmark.pedantic(run_miner, rounds=3, iterations=1)
    t0 = time.monotonic()
    baseline = brute_mine(LocalPLIEngine(pdf), 0.1)
    t_base = time.monotonic() - t0
    assert set(res.full_mvds) == baseline
    df = pd.DataFrame(
        [
            {
                "relation": f"planted 6 cols x {len(pdf)} rows",
                "miner_s": round(res.elapsed, 4),
                "baseline_s": round(t_base, 4),
                "n_full_mvds": res.n_full_mvds,
            }
        ]
    )
    write_markdown(df, "baseline", "MVDMiner vs exhaustive baseline")
    print("\n", df.to_string(index=False))
