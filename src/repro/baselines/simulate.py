"""Monte-Carlo estimation of the influence spread σ(S) under the IC model.

Each simulation samples one live-edge graph (hash-deterministic, salt
stream ``SALT_SIM`` — disjoint from the sketch stream, so evaluating a
seed set never reuses the coins that selected it) and BFS-counts the
vertices reachable from S. On undirected graphs this is exactly the IC
process outcome: a vertex activates iff a live path connects it to a
seed.

``estimate_spread`` distributes the simulations (one Spark task per
block of simulation ids); ``estimate_spread_local`` is the driver-side
reference used by tests.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.graphs.csr import CSR
from repro.hashing import SALT_SIM, u01


def _spread_once(
    csr: CSR, probs: np.ndarray, seeds: np.ndarray, salt: int
) -> int:
    """#vertices activated from ``seeds`` in one sampled live-edge graph."""
    visited = np.zeros(csr.n, dtype=bool)
    visited[seeds] = True
    frontier = np.unique(seeds)
    count = len(frontier)
    indptr, adj, arc_key = csr.indptr, csr.adj, csr.arc_key
    while frontier.size:
        arc_idx = np.concatenate(
            [np.arange(indptr[f], indptr[f + 1]) for f in frontier]
        )
        if arc_idx.size == 0:
            break
        alive = u01(arc_key[arc_idx], salt) < probs[arc_idx]
        nbrs = adj[arc_idx[alive]]
        nbrs = nbrs[~visited[nbrs]]
        if nbrs.size == 0:
            break
        frontier = np.unique(nbrs).astype(np.int64)
        visited[frontier] = True
        count += len(frontier)
    return count


def estimate_spread_local(
    csr: CSR,
    probs: np.ndarray,
    seeds,
    *,
    n_sims: int,
    sim_offset: int = 0,
) -> float:
    """Mean spread over ``n_sims`` simulations, driver-side."""
    seeds = np.asarray(list(seeds), dtype=np.int64)
    if seeds.size == 0:
        return 0.0
    total = sum(
        _spread_once(csr, probs, seeds, SALT_SIM + sim_offset + i)
        for i in range(n_sims)
    )
    return total / n_sims


def estimate_spread(
    spark: SparkSession,
    csr: CSR,
    probs: np.ndarray,
    seeds,
    *,
    n_sims: int,
    sim_offset: int = 0,
) -> float:
    """Mean spread over ``n_sims`` simulations, one Spark job."""
    seeds = np.asarray(list(seeds), dtype=np.int64)
    if seeds.size == 0:
        return 0.0
    bc = spark.sparkContext.broadcast((csr, probs))

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        csr_b, probs_b = bc.value
        for pdf in batches:
            counts = [
                _spread_once(csr_b, probs_b, seeds, SALT_SIM + sim_offset + int(i))
                for i in pdf["id"]
            ]
            yield pd.DataFrame({"spread": counts})

    out = (
        spark.range(n_sims)  # range already spreads ids over the cores
        .mapInPandas(kernel, schema="spread long")
        .toPandas()
    )
    return float(out["spread"].mean())
