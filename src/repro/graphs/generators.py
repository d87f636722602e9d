"""Deterministic synthetic graph generators.

These are the laptop-scale stand-ins for the paper's Table 3 inputs
(DESIGN.md §2, §4):

- :func:`rmat` — recursive-matrix scale-free graphs (social/web analogs);
- :func:`grid2d` — 2-D lattices (road-network analogs);
- :func:`knn_graph` — k-nearest-neighbour graphs over random points
  (the paper's k-NN class, optionally clustered);
- :func:`erdos_renyi` — uniform random graphs for tests.

Every generator returns a canonical undirected edge list as an
``(m, 2) int64`` numpy array with ``u < v``, deduplicated, no self loops
— the exact input shape :func:`repro.graphs.csr.build_csr` expects.
All are deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def _canonicalize(us: np.ndarray, vs: np.ndarray) -> np.ndarray:
    """Symmetrize + dedup + drop self loops; rows sorted for determinism."""
    lo = np.minimum(us, vs).astype(np.int64)
    hi = np.maximum(us, vs).astype(np.int64)
    keep = lo != hi
    lo, hi = lo[keep], hi[keep]
    key = lo * (hi.max() + 1 if hi.size else 1) + hi
    _, idx = np.unique(key, return_index=True)
    edges = np.stack([lo[idx], hi[idx]], axis=1)
    order = np.lexsort((edges[:, 1], edges[:, 0]))
    return edges[order]


def rmat(
    n: int,
    m_target: int,
    *,
    seed: int,
    a: float = 0.57,
    b: float = 0.19,
    c: float = 0.19,
) -> np.ndarray:
    """RMAT scale-free generator (Chakrabarti et al. parameters by default).

    ``n`` must be a power of two. Oversamples arcs by 15% to compensate for
    duplicate collapse, then canonicalizes; the returned edge count is
    therefore approximately (not exactly) ``m_target``.
    """
    if n & (n - 1):
        raise ValueError("rmat requires n to be a power of two")
    levels = int(np.log2(n))
    g = np.random.default_rng(seed)
    n_arcs = int(m_target * 1.15)
    us = np.zeros(n_arcs, dtype=np.int64)
    vs = np.zeros(n_arcs, dtype=np.int64)
    p_u = a + b  # P(descend into top half for the source bit)
    for _ in range(levels):
        u_bit = g.random(n_arcs) >= p_u
        # Conditional distribution of the destination bit given the source bit.
        p_v_given = np.where(u_bit, c / (c + (1 - a - b - c)), a / (a + b))
        v_bit = g.random(n_arcs) >= p_v_given
        us = (us << 1) | u_bit
        vs = (vs << 1) | v_bit
    return _canonicalize(us, vs)


def grid2d(rows: int, cols: int) -> np.ndarray:
    """2-D lattice: vertex (i, j) -> id i*cols + j, 4-neighbourhood."""
    i, j = np.meshgrid(np.arange(rows), np.arange(cols), indexing="ij")
    vid = (i * cols + j).ravel()
    right_src = vid[(j < cols - 1).ravel()]
    down_src = vid[(i < rows - 1).ravel()]
    us = np.concatenate([right_src, down_src])
    vs = np.concatenate([right_src + 1, down_src + cols])
    return _canonicalize(us, vs)


def knn_graph(
    n: int, k: int, *, seed: int, dim: int = 2, clusters: int = 0
) -> np.ndarray:
    """k-NN graph over random points, symmetrized.

    With ``clusters > 0`` points are drawn around that many Gaussian
    centers (the paper's k-NN datasets — GeoLife, CHEM — are strongly
    clustered). Brute-force distance in blocks; fine for n <= ~50k.
    """
    g = np.random.default_rng(seed)
    if clusters > 0:
        centers = g.random((clusters, dim)) * 10.0
        assign = g.integers(0, clusters, n)
        pts = centers[assign] + g.normal(0, 0.3, (n, dim))
    else:
        pts = g.random((n, dim))
    us_list, vs_list = [], []
    block = 2048
    for start in range(0, n, block):
        d = ((pts[start : start + block, None, :] - pts[None, :, :]) ** 2).sum(-1)
        rows = np.arange(start, min(start + block, n))
        d[np.arange(len(rows)), rows] = np.inf  # mask self distance
        nbrs = np.argpartition(d, k, axis=1)[:, :k]
        us_list.append(np.repeat(rows, k))
        vs_list.append(nbrs.ravel())
    return _canonicalize(np.concatenate(us_list), np.concatenate(vs_list))


def erdos_renyi(n: int, m_target: int, *, seed: int) -> np.ndarray:
    """G(n, m)-style uniform random graph (approximate m after dedup)."""
    g = np.random.default_rng(seed)
    n_arcs = int(m_target * 1.1) + 8
    return _canonicalize(g.integers(0, n, n_arcs), g.integers(0, n, n_arcs))


def to_spark_edges(spark: SparkSession, edges: np.ndarray) -> DataFrame:
    """Edge list as a Spark DataFrame (columns ``u``, ``v``; u < v)."""
    return spark.createDataFrame(
        pd.DataFrame({"u": edges[:, 0], "v": edges[:, 1]})
    )


# ---------------------------------------------------------------------------
# The experiment suite (DESIGN.md §4): synthetic analogs of paper Tab. 3.
# Each entry: (class, generator thunk, Consistent-model p).
# ---------------------------------------------------------------------------
SUITE: dict[str, dict] = {
    "SF-A": dict(cls="scale-free", p=0.10,
                 gen=lambda: rmat(8192, 70_000, seed=11)),
    "SF-B": dict(cls="scale-free", p=0.10,
                 gen=lambda: rmat(16384, 130_000, seed=12)),
    "SF-C": dict(cls="scale-free", p=0.10,
                 gen=lambda: rmat(8192, 160_000, seed=13)),
    "SF-D": dict(cls="scale-free", p=0.10,
                 gen=lambda: rmat(32768, 260_000, seed=14)),
    "ROAD-A": dict(cls="sparse", p=0.20,
                   gen=lambda: grid2d(110, 110)),
    "ROAD-B": dict(cls="sparse", p=0.20,
                   gen=lambda: grid2d(155, 155)),
    "KNN-A": dict(cls="sparse", p=0.20,
                  gen=lambda: knn_graph(8192, 5, seed=21)),
    "KNN-B": dict(cls="sparse", p=0.30,
                  gen=lambda: knn_graph(16384, 5, seed=22, clusters=40)),
}


def suite_graph(name: str) -> tuple[np.ndarray, float, str]:
    """Return (edges, consistent_p, class) for a suite graph by name."""
    spec = SUITE[name]
    return spec["gen"](), spec["p"], spec["cls"]
