"""Sequential CELF seed selection (paper Alg. 2) — the baseline that
InfuserMG/StaticGreedy use, and the yardstick for Thm. 4.2.

All selectors in this package share one strict total order on
candidates: vertex a beats vertex b iff (score_a, -a) > (score_b, -b)
lexicographically — i.e. higher score first, ties broken by smaller
vertex id, the paper's tie-break convention. This makes every selector
deterministic and lets tests assert they all pick *identical* seed sets
(Thms. 4.1 / 4.4).
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass, field

import numpy as np


def key(score: float, v: int) -> tuple[float, int]:
    """Strict-total-order sort key: higher score, then smaller id."""
    return (float(score), -int(v))


@dataclass
class SelectionResult:
    """Outcome of a seed-selection run."""

    seeds: list[int]
    gains: list[float]  # marginal gain of each seed at selection time
    n_reevals: int  # re-evaluations (excludes the initial n scores)
    n_jobs: int  # evaluation batches = parallel rounds
    structure_bytes: int  # priority-structure space
    extra: dict = field(default_factory=dict)

    @property
    def est_influence(self) -> float:
        """Sketch-estimated σ(S): marginal gains telescope."""
        return float(sum(self.gains))


class EvalBudgetExceeded(RuntimeError):
    """Raised when a selector exceeds its evaluation-job budget — the
    analog of the paper's 3-hour '-' entries."""


def _check_budget(evaluator, max_jobs: int | None) -> None:
    if max_jobs is not None and evaluator.n_jobs > max_jobs:
        raise EvalBudgetExceeded(f"exceeded {max_jobs} evaluation jobs")


def celf_select(evaluator, k: int, *, max_jobs: int | None = None) -> SelectionResult:
    """Greedy seed selection with lazy (CELF) re-evaluation.

    Pops the stalest-top vertex, re-evaluates it (one 1-vertex batch =
    one evaluation job), and selects it iff its true key still beats the
    queue's top — otherwise reinserts with the fresh score.
    """
    scores = evaluator.init_scores()
    n = len(scores)
    jobs0, evals0 = evaluator.n_jobs, evaluator.n_reevals
    # heapq is a min-heap: negate the key so the best candidate pops first.
    heap = [(-scores[v], v) for v in range(n)]
    heapq.heapify(heap)
    seeds: list[int] = []
    gains: list[float] = []
    while len(seeds) < k and heap:
        while True:
            neg, v = heapq.heappop(heap)
            true = float(evaluator.evaluate(np.array([v]))[0])
            _check_budget(evaluator, max_jobs)
            if not heap or key(true, v) > key(-heap[0][0], heap[0][1]):
                seeds.append(v)
                gains.append(true)
                evaluator.mark_seed(v)
                break
            heapq.heappush(heap, (-true, v))
    return SelectionResult(
        seeds=seeds,
        gains=gains,
        n_reevals=evaluator.n_reevals - evals0,
        n_jobs=evaluator.n_jobs - jobs0,
        structure_bytes=16 * n,  # (score, id) pairs in the binary heap
    )
