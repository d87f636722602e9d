"""Marginal-gain evaluation (paper Alg. 3: GetCenter / Marginal / MarkSeed).

``get_center`` runs the local BFS simulation on the hash-reconstructed
sampled graph G'_r: it stops as soon as a center is reached (and returns
the memoized CC size for that center's label), returns 0 if the CC turns
out to contain a seed, and otherwise returns the number of vertices it
exhaustively visited (= the CC size). Expected visits are
O(min(T, 1/α)) per sketch (Thm. 3.1).

Two evaluators share this kernel:

- :class:`LocalEvaluator` — driver-side numpy; used where only
  *evaluation counts* matter (Table 5) and in unit tests;
- :class:`SparkEvaluator` — one Spark job per evaluation **batch**: the
  batch explodes into (vertex, sketch) rows, a ``mapInPandas`` kernel
  evaluates them against the broadcast CSR + sketches, and the driver
  averages per vertex. A 1-vertex batch is still a job — that is exactly
  the sequential-CELF cost model of the baselines (DESIGN.md §2).

``MarkSeed`` always runs on the driver (it is O(R) tiny BFS runs) and
its effect is shipped to tasks as a small set of zeroed (sketch, label)
pairs, so the broadcast sketch arrays stay immutable.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.sketches import Sketches
from repro.graphs.csr import CSR
from repro.hashing import SALT_SKETCH, u01


def get_center(
    csr: CSR,
    probs: np.ndarray,
    center_index: np.ndarray,
    labels: np.ndarray,
    sizes: np.ndarray,
    r: int,
    v: int,
    seeds_mask: np.ndarray,
    zeroed_r: set[int] | frozenset[int],
) -> tuple[int, int, int]:
    """(marginal δ of v on sketch r, CC label or -1, #BFS visits).

    ``sizes`` may already have zeroed entries (LocalEvaluator mutates its
    copy in place); ``zeroed_r`` additionally overrides labels zeroed
    since the arrays were broadcast (SparkEvaluator path).
    """
    salt = SALT_SKETCH + r
    ci = center_index[v]
    if ci >= 0:  # v itself memoizes its CC — O(1), the α=1 fast path
        lab = int(labels[r, ci])
        delta = 0 if lab in zeroed_r else int(sizes[r, lab])
        return delta, lab, 1
    visited = np.zeros(csr.n, dtype=bool)
    visited[v] = True
    frontier = np.array([v], dtype=np.int64)
    n_visited = 1
    seed_seen = bool(seeds_mask[v])
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
        fresh = np.unique(nbrs).astype(np.int64)
        visited[fresh] = True
        n_visited += len(fresh)
        cis = center_index[fresh]
        hits = cis[cis >= 0]
        if hits.size:  # a center is reached: adopt its memoized CC info
            lab = int(labels[r, hits[0]])
            delta = 0 if lab in zeroed_r else int(sizes[r, lab])
            return delta, lab, n_visited
        if not seed_seen and seeds_mask[fresh].any():
            seed_seen = True
        frontier = fresh
    if seed_seen:  # whole CC traversed, a seed is inside: no gain
        return 0, -1, n_visited
    return n_visited, -1, n_visited  # CC size = #visited (no center, no seed)


def _eval_pairs(
    csr: CSR,
    probs: np.ndarray,
    sk: Sketches,
    sizes: np.ndarray,
    vs: np.ndarray,
    rs: np.ndarray,
    seeds_mask: np.ndarray,
    zeroed: dict[int, frozenset[int]],
) -> tuple[np.ndarray, int]:
    """δ for each (v, r) pair; returns (deltas, total BFS visits)."""
    out = np.zeros(len(vs), dtype=np.float64)
    visits = 0
    empty: frozenset[int] = frozenset()
    for i, (v, r) in enumerate(zip(vs, rs)):
        d, _, nv = get_center(
            csr, probs, sk.center_index, sk.labels, sizes,
            int(r), int(v), seeds_mask, zeroed.get(int(r), empty),
        )
        out[i] = d
        visits += nv
    return out, visits


class LocalEvaluator:
    """Driver-side evaluator; mutates its own copy of the size arrays.

    Counters: ``n_reevals`` (total vertices re-evaluated — the paper's
    Table 5 quantity), ``n_jobs`` (evaluation batches — the parallel-
    rounds / span proxy), ``n_visits`` (BFS visits — Thm. 3.1 quantity).
    """

    def __init__(self, csr: CSR, probs: np.ndarray, sketches: Sketches):
        self.csr = csr
        self.probs = probs
        self.sk = sketches
        self.sizes = sketches.sizes.copy()
        self.seeds: list[int] = []
        self.seeds_mask = np.zeros(csr.n, dtype=bool)
        self.zeroed: dict[int, set[int]] = {}
        self.n_reevals = 0
        self.n_jobs = 0
        self.n_visits = 0

    @property
    def n(self) -> int:
        return self.csr.n

    def init_scores(self) -> np.ndarray:
        """Marginal(∅, v) for all v — harvested at sketch construction."""
        return self.sk.init_scores.copy()

    def _full_memo(self) -> bool:
        return self.sk.rho == self.csr.n

    def evaluate(self, vs: np.ndarray) -> np.ndarray:
        """True marginal gains of a batch; one parallel round."""
        vs = np.asarray(vs, dtype=np.int64)
        self.n_reevals += len(vs)
        self.n_jobs += 1
        if self._full_memo():
            # α = 1: every vertex is a center; pure 2-D array lookup.
            labs = self.sk.labels[:, vs]  # (R, |vs|)
            vals = self.sizes[np.arange(self.sk.R)[:, None], labs]
            self.n_visits += vals.size
            return vals.mean(axis=0)
        rs = np.tile(np.arange(self.sk.R), len(vs))
        vv = np.repeat(vs, self.sk.R)
        deltas, nv = _eval_pairs(
            self.csr, self.probs, self.sk, self.sizes,
            vv, rs, self.seeds_mask, {},
        )
        self.n_visits += nv
        return deltas.reshape(len(vs), self.sk.R).mean(axis=1)

    def mark_seed(self, v: int) -> None:
        """Paper's MarkSeed: zero the CC size of v's component on every
        sketch whose CC has a center; record the zeroed labels so Spark
        tasks (reading the immutable broadcast) can apply the override."""
        v = int(v)
        empty: frozenset[int] = frozenset()
        for r in range(self.sk.R):
            _, lab, nv = get_center(
                self.csr, self.probs, self.sk.center_index,
                self.sk.labels, self.sizes, r, v, self.seeds_mask, empty,
            )
            self.n_visits += nv
            if lab >= 0:
                self.sizes[r, lab] = 0
                self.zeroed.setdefault(r, set()).add(int(lab))
        self.seeds.append(v)
        self.seeds_mask[v] = True


class SparkEvaluator(LocalEvaluator):
    """Evaluation batches dispatched as Spark jobs over (v, r) rows.

    The CSR, probabilities, and pristine sketch arrays are broadcast at
    construction; per-call state (current seeds, zeroed labels) travels
    in the task closure — a few hundred integers at most.
    """

    def __init__(
        self, spark: SparkSession, csr: CSR, probs: np.ndarray, sketches: Sketches
    ):
        super().__init__(csr, probs, sketches)
        self.spark = spark
        self._bc = spark.sparkContext.broadcast(
            (csr, probs, sketches.center_index, sketches.labels, sketches.sizes)
        )
        self._parallelism = spark.sparkContext.defaultParallelism

    def evaluate(self, vs: np.ndarray) -> np.ndarray:
        vs = np.asarray(vs, dtype=np.int64)
        self.n_reevals += len(vs)
        self.n_jobs += 1
        R = self.sk.R
        pairs = pd.DataFrame(
            {"v": np.repeat(vs, R), "r": np.tile(np.arange(R), len(vs))}
        )
        bc = self._bc
        seeds = np.array(self.seeds, dtype=np.int64)
        zeroed = {r: frozenset(ls) for r, ls in self.zeroed.items()}
        sk = self.sk

        def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            csr_b, probs_b, cidx_b, labels_b, sizes_b = bc.value
            mask = np.zeros(csr_b.n, dtype=bool)
            mask[seeds] = True
            empty: frozenset[int] = frozenset()
            for pdf in batches:
                deltas = np.zeros(len(pdf), dtype=np.float64)
                visits = np.zeros(len(pdf), dtype=np.int64)
                for i, (v, r) in enumerate(zip(pdf["v"].values, pdf["r"].values)):
                    d, _, nv = get_center(
                        csr_b, probs_b, cidx_b, labels_b, sizes_b,
                        int(r), int(v), mask, zeroed.get(int(r), empty),
                    )
                    deltas[i] = d
                    visits[i] = nv
                yield pd.DataFrame(
                    {"v": pdf["v"].values, "delta": deltas, "visits": visits}
                )

        # Arrow-based createDataFrame already splits the pairs across
        # defaultParallelism partitions; an explicit repartition would add
        # a shuffle stage and dominate small-batch latency.
        out = (
            self.spark.createDataFrame(pairs)
            .mapInPandas(kernel, schema="v long, delta double, visits long")
            .toPandas()
        )
        self.n_visits += int(out["visits"].sum())
        agg = out.groupby("v")["delta"].mean()
        return agg.reindex(vs).to_numpy()
