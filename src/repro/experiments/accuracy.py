"""Sec. 8.2 / Fig 12: spurious-tuple percentage vs J-measure.

Generate all schemes with thresholds in [0, 0.5], bucket them by J(S),
and report quantiles of the spurious-tuple percentage per bucket. The
paper's claim, which we verify, is a consistent monotone relationship
between J and the spurious rate (with J = 0 iff 0% spurious).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro import datasets
from repro.core.miner import MVDMiner
from repro.core.quality import spurious_pct
from repro.core.schema_miner import enumerate_schemas
from repro.entropy.local_pli import LocalPLIEngine
from repro.experiments.common import write_markdown

DEFAULT_DATASETS = ("abalone", "breast_cancer", "echocardiogram", "bridges")


def collect_schemes(
    pdf: pd.DataFrame,
    thresholds: list[float],
    *,
    max_schemas_per_eps: int = 50,
    mine_deadline_s: float = 30.0,
) -> list[tuple[tuple, float]]:
    """(bags, J) for the union of schemes over the threshold sweep."""
    engine = LocalPLIEngine(pdf)
    out: dict[tuple, float] = {}
    for eps in thresholds:
        res = MVDMiner(engine, eps, deadline_s=mine_deadline_s).mine()
        for schema in enumerate_schemas(
            res.full_mvds, engine.columns, max_schemas=max_schemas_per_eps
        ):
            if schema.bags not in out:
                out[schema.bags] = engine.j_tree(
                    list(schema.tree.bags), list(schema.tree.edges)
                )
    return sorted(out.items(), key=lambda kv: kv[1])


def run_accuracy(
    spark,
    *,
    names: tuple[str, ...] = DEFAULT_DATASETS,
    thresholds: list[float] | None = None,
    rows_cap: int = 800,
    noise: float = 0.03,
    quality_cap: int = 30,
    n_buckets: int = 5,
) -> pd.DataFrame:
    """Per dataset and J-bucket: #schemes and spurious-% quantiles."""
    if thresholds is None:
        thresholds = [0.0, 0.05, 0.1, 0.2, 0.3, 0.5]
    rows = []
    for name in names:
        pdf = datasets.load(name, rows_cap=rows_cap, noise=noise)
        df = spark.createDataFrame(pdf)
        df.persist()
        n_rows = df.count()
        schemes = collect_schemes(pdf, thresholds)
        if len(schemes) > quality_cap:
            # Stratify across the J range (Fig 12 buckets the full range).
            idx = np.unique(
                np.linspace(0, len(schemes) - 1, quality_cap).astype(int)
            )
            schemes = [schemes[i] for i in idx]
        if not schemes:
            df.unpersist()
            continue
        measured = [
            {"J": j, "spurious_pct": spurious_pct(df, list(bags), n_rows)}
            for bags, j in schemes
        ]
        df.unpersist()
        m = pd.DataFrame(measured)
        j_max = max(m["J"].max(), 1e-9)
        m["bucket"] = np.minimum((m["J"] / j_max * n_buckets).astype(int), n_buckets - 1)
        for b, grp in m.groupby("bucket"):
            rows.append(
                {
                    "dataset": name,
                    "J_bucket": f"[{b * j_max / n_buckets:.3f}, {(b + 1) * j_max / n_buckets:.3f})",
                    "n_schemes": len(grp),
                    "spurious_q25": round(grp["spurious_pct"].quantile(0.25), 2),
                    "spurious_median": round(grp["spurious_pct"].median(), 2),
                    "spurious_q75": round(grp["spurious_pct"].quantile(0.75), 2),
                }
            )
    out = pd.DataFrame(rows)
    write_markdown(out, "accuracy", "Fig 12 — spurious tuples (%) vs J-measure buckets")
    return out
