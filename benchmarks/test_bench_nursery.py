"""Benchmark: Figs 10-11 — the Nursery use case (schemes with savings S
and spurious E, pareto front). Writes results/nursery_*.md."""
from repro.experiments.common import to_markdown
from repro.experiments.nursery_usecase import run_nursery


def test_bench_nursery(benchmark, spark):
    schemes, pareto = benchmark.pedantic(
        lambda: run_nursery(
            spark,
            thresholds=[0.0, 0.02, 0.05, 0.1, 0.3, 0.5],
            max_schemas_per_eps=400,
            quality_cap=60,
        ),
        rounds=1,
        iterations=1,
    )
    print("\nAll schemes (capped):\n" + to_markdown(schemes))
    print("\nPareto front:\n" + to_markdown(pareto))
    assert len(schemes) >= 3
    assert len(pareto) >= 1
    # Fig 10 shape: schemes exist with high savings; J correlates with E
    # (the lowest-J scheme has no more spurious tuples than the highest-J).
    lo = schemes.loc[schemes["J"].idxmin()]
    hi = schemes.loc[schemes["J"].idxmax()]
    assert lo["spurious_pct"] <= hi["spurious_pct"] + 1e-9
