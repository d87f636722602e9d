"""StaticGreedy [22] emulation (DESIGN.md §2).

StaticGreedy keeps no memoization at all: every evaluation simulates
influence by traversing the (hash-reconstructed) sampled graphs, and
seeds are selected with sequential CELF. In the paper's Tab. 2 matrix
that is PaC-IM with α = 0 — evaluations cost O(RT) visits instead of
O(R·min(T, 1/α)) — so, like InfuserMG, it is a parameterization of
:func:`repro.core.pacim.run_pacim`.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from repro.core.pacim import run_pacim
from repro.graphs.csr import CSR


def run_staticgreedy(
    spark: SparkSession | None,
    csr: CSR,
    probs: np.ndarray,
    *,
    R: int,
    k: int,
    backend: str = "spark",
    max_eval_jobs: int | None = None,
) -> dict:
    """α = 0 pure simulation + sequential CELF."""
    return run_pacim(
        spark, csr, probs, R=R, alpha=0.0, k=k,
        selector="celf", backend=backend, max_eval_jobs=max_eval_jobs,
    )
