"""Shared fixtures/builders for the test suite."""
from __future__ import annotations

import math

import numpy as np
import pandas as pd

from repro.entropy.local_pli import LocalPLIEngine


def fig1_relation() -> pd.DataFrame:
    """Our transcription of the paper's Fig. 1 relation (4 rows over
    A..F). The figure's exact tuples are an image we do not have; this
    relation reproduces every quantity stated in the text: H(ABCDEF) =
    log 4 = 2 and BDE marginals 1/4, 1/4, 1/2 giving H(BDE) = 3/2."""
    rows = [
        ("a1", "b1", "c1", "d1", "e1", "f1"),
        ("a1", "b1", "c2", "d1", "e1", "f1"),
        ("a1", "b2", "c1", "d1", "e2", "f1"),
        ("a2", "b2", "c2", "d2", "e2", "f2"),
    ]
    return pd.DataFrame(rows, columns=list("ABCDEF"))


def exact_jd_relation() -> pd.DataFrame:
    """4 rows satisfying the acyclic JD of schema {ABD, ACD, BDE, AF}
    exactly (B x C product inside the (a1, d1) group; E, F functionally
    determined), so J of that schema is 0."""
    rows = [
        ("a1", "b1", "c1", "d1", "e1", "f1"),
        ("a1", "b1", "c2", "d1", "e1", "f1"),
        ("a1", "b2", "c1", "d1", "e1", "f1"),
        ("a1", "b2", "c2", "d1", "e1", "f1"),
    ]
    return pd.DataFrame(rows, columns=list("ABCDEF"))


def sec52_relation() -> pd.DataFrame:
    """The Sec. 5.2 counterexample: two tuples over X, A, B, C with
    X constant; J(X->>AB|C) = J(X->>AC|B) = J(X->>BC|A) = 1 but
    J(X->>A|B|C) = 2."""
    return pd.DataFrame(
        [(0, 0, 0, 0), (0, 1, 1, 1)], columns=["X", "A", "B", "C"]
    )


def random_relation(n_rows: int, cols: str, n_vals: int, seed: int) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        g.integers(0, n_vals, size=(n_rows, len(cols))), columns=list(cols)
    )


def engine_of(pdf: pd.DataFrame, **kw) -> LocalPLIEngine:
    return LocalPLIEngine(pdf, **kw)


def naive_entropy(pdf: pd.DataFrame, cols) -> float:
    """Direct Eq. (5) in pandas, the reference for every engine."""
    n = len(pdf)
    counts = pdf.groupby(list(cols), observed=True).size().to_numpy()
    return math.log2(n) - sum(c * math.log2(c) for c in counts) / n
