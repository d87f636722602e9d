"""Unit tests for CELF seed selection (paper Alg. 2)."""
import numpy as np
import pytest

from repro.core.celf import EvalBudgetExceeded, SelectionResult, celf_select, key
from repro.core.evaluate import LocalEvaluator
from repro.core.sketches import build_sketches_local
from tests.conftest import exhaustive_greedy


def test_key_order():
    assert key(2.0, 5) > key(1.0, 1)
    assert key(2.0, 1) > key(2.0, 5)  # tie → smaller id wins
    assert key(2.0, 5) == key(2.0, 5)


@pytest.mark.parametrize("k", [1, 3, 6])
def test_matches_exhaustive_greedy(small_case, k):
    _, csr, probs = small_case
    R = 6
    sk = build_sketches_local(csr, probs, R=R, alpha=0.3)
    res = celf_select(LocalEvaluator(csr, probs, sk), k)
    want_seeds, want_gains = exhaustive_greedy(csr, probs, R, k)
    assert res.seeds == want_seeds
    assert np.allclose(res.gains, want_gains)


def test_gains_nonincreasing(small_case):
    # Submodularity: greedy marginal gains are non-increasing.
    _, csr, probs = small_case
    sk = build_sketches_local(csr, probs, R=8, alpha=0.5)
    res = celf_select(LocalEvaluator(csr, probs, sk), 10)
    assert all(a >= b - 1e-9 for a, b in zip(res.gains, res.gains[1:]))


def test_one_job_per_reevaluation(er_setup):
    csr, probs, sk = er_setup
    res = celf_select(LocalEvaluator(csr, probs, sk), 5)
    assert res.n_jobs == res.n_reevals  # strictly sequential


def test_at_least_one_eval_per_round(er_setup):
    csr, probs, sk = er_setup
    res = celf_select(LocalEvaluator(csr, probs, sk), 7)
    assert res.n_reevals >= 7
    assert len(res.seeds) == 7
    assert len(set(res.seeds)) == 7


def test_est_influence_telescopes(er_setup):
    csr, probs, sk = er_setup
    res = celf_select(LocalEvaluator(csr, probs, sk), 4)
    assert res.est_influence == pytest.approx(sum(res.gains))


def test_budget_exceeded(er_setup):
    csr, probs, sk = er_setup
    with pytest.raises(EvalBudgetExceeded):
        celf_select(LocalEvaluator(csr, probs, sk), 50, max_jobs=3)


def test_k_larger_than_n():
    import numpy as np

    from repro.graphs.csr import build_csr
    from repro.graphs.probs import consistent_probs

    csr = build_csr(np.array([[0, 1], [1, 2]]), n=3)
    probs = consistent_probs(csr, 0.5)
    sk = build_sketches_local(csr, probs, R=4, alpha=1.0)
    res = celf_select(LocalEvaluator(csr, probs, sk), 10)
    assert sorted(res.seeds) == [0, 1, 2]


def test_result_dataclass_defaults():
    r = SelectionResult(seeds=[1], gains=[2.0], n_reevals=1, n_jobs=1, structure_bytes=0)
    assert r.extra == {}
    assert r.est_influence == 2.0
