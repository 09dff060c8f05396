"""Shared plumbing for the evaluation-section reproductions (Sec. 8).

Each experiment module exposes ``run_*`` functions that return a pandas
DataFrame shaped like the paper's table/figure data, and can write it as
a markdown table under ``results/``. Engine construction is pluggable:
benchmarks use the driver-side PLI engine on generated pandas frames;
``jobs/`` route the scan through Spark (``LocalPLIEngine.from_spark``).
"""
from __future__ import annotations

import os
from typing import Callable

import pandas as pd

from repro.entropy.base import EntropyEngine
from repro.entropy.local_pli import LocalPLIEngine

EngineFactory = Callable[[pd.DataFrame], EntropyEngine]


def local_engine(pdf: pd.DataFrame) -> EntropyEngine:
    """Default engine factory: driver-side PLI cache over a pandas frame."""
    return LocalPLIEngine(pdf)


def spark_engine_factory(spark) -> EngineFactory:
    """Engine factory that routes the input scan through Spark."""

    def make(pdf: pd.DataFrame) -> EntropyEngine:
        return LocalPLIEngine.from_spark(spark.createDataFrame(pdf))

    return make


def results_dir() -> str:
    d = os.environ.get("REPRO_RESULTS_DIR", os.path.join(os.getcwd(), "results"))
    os.makedirs(d, exist_ok=True)
    return d


def to_markdown(df: pd.DataFrame) -> str:
    """Plain markdown table (``tabulate`` is unavailable offline)."""
    cols = [str(c) for c in df.columns]
    lines = ["| " + " | ".join(cols) + " |", "|" + "|".join("---" for _ in cols) + "|"]
    for _, row in df.iterrows():
        lines.append("| " + " | ".join(str(v) for v in row) + " |")
    return "\n".join(lines)


def write_markdown(df: pd.DataFrame, name: str, title: str) -> str:
    """Write a results table as markdown; returns the path."""
    path = os.path.join(results_dir(), f"{name}.md")
    with open(path, "w") as f:
        f.write(f"# {title}\n\n")
        f.write(to_markdown(df))
        f.write("\n")
    return path


def fmt_runtime(elapsed: float, timed_out: bool) -> str:
    """Paper-style runtime cell: seconds, or 'TL' when the limit hit."""
    return "TL" if timed_out else f"{elapsed:.2f}"
