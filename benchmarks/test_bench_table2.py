"""Benchmark: Table 2 — full MVD mining at eps=0 over all 20 dataset
analogs with a scaled time limit. Prints the paper-vs-ours table and
writes results/table2.md."""
from repro.experiments.common import to_markdown
from repro.experiments.table2 import run_table2


def test_bench_table2(benchmark):
    df = benchmark.pedantic(
        lambda: run_table2(rows_cap=2_000, timeout_s=20.0),
        rounds=1,
        iterations=1,
    )
    print("\n" + to_markdown(df))
    assert len(df) == 20
    # shape: the paper's TL datasets are the wide ones; ours must report
    # at least one TL among the >25-column analogs under the scaled limit
    wide = df[df["cols"] >= 26]
    assert (wide["runtime_s"] == "TL").any()
    # and the narrow datasets must complete
    narrow = df[df["cols"] <= 12]
    assert (narrow["runtime_s"] != "TL").any()
