"""Tests for the Monte-Carlo influence oracle."""
import numpy as np
import pytest

from repro.baselines.simulate import _spread_once, estimate_spread_local
from repro.graphs.csr import build_csr
from repro.graphs.generators import erdos_renyi
from repro.graphs.probs import consistent_probs
from repro.hashing import SALT_SIM, u01


def test_spread_counts_seeds_themselves():
    csr = build_csr(np.array([[0, 1]]), n=3)
    probs = consistent_probs(csr, 0.0)  # no edge ever live
    assert estimate_spread_local(csr, probs, [0, 2], n_sims=10) == 2.0


def test_spread_full_probability():
    csr = build_csr(np.array([[0, 1], [1, 2], [2, 3]]), n=4)
    probs = consistent_probs(csr, 1.0)
    assert estimate_spread_local(csr, probs, [0], n_sims=5) == 4.0


def test_spread_empty_seed_set():
    csr = build_csr(np.array([[0, 1]]), n=2)
    assert estimate_spread_local(csr, consistent_probs(csr, 0.5), [], n_sims=3) == 0.0


def test_single_edge_matches_analytic():
    # σ({0}) on a single edge with prob p is 1 + p.
    csr = build_csr(np.array([[0, 1]]), n=2)
    p = 0.3
    probs = consistent_probs(csr, p)
    est = estimate_spread_local(csr, probs, [0], n_sims=4000)
    assert est == pytest.approx(1 + p, abs=0.03)


def test_path_matches_analytic():
    # σ({0}) on a path 0-1-2: 1 + p + p^2.
    csr = build_csr(np.array([[0, 1], [1, 2]]), n=3)
    p = 0.4
    probs = consistent_probs(csr, p)
    est = estimate_spread_local(csr, probs, [0], n_sims=6000)
    assert est == pytest.approx(1 + p + p * p, abs=0.05)


def test_triangle_matches_analytic():
    # σ({0}) on a triangle: 1 + 2(2p^2 - p^3 + p(1-p)^2)… compute by
    # enumeration over the 8 live-edge patterns instead.
    csr = build_csr(np.array([[0, 1], [0, 2], [1, 2]]), n=3)
    p = 0.5
    want = 0.0
    for bits in range(8):
        live = [(bits >> i) & 1 for i in range(3)]
        prob = np.prod([p if b else 1 - p for b in live])
        # reachable from 0: edges (0,1),(0,2),(1,2)
        reach = {0}
        for _ in range(2):
            if live[0] and 0 in reach:
                reach.add(1)
            if live[1] and 0 in reach:
                reach.add(2)
            if live[2] and (1 in reach or 2 in reach):
                reach.update({1, 2})
        want += prob * len(reach)
    probs = consistent_probs(csr, p)
    est = estimate_spread_local(csr, probs, [0], n_sims=8000)
    assert est == pytest.approx(want, abs=0.05)


def test_monotone_in_seed_set():
    csr = build_csr(erdos_renyi(120, 260, seed=4), n=120)
    probs = consistent_probs(csr, 0.2)
    s1 = estimate_spread_local(csr, probs, [3], n_sims=300)
    s2 = estimate_spread_local(csr, probs, [3, 50], n_sims=300)
    s3 = estimate_spread_local(csr, probs, [3, 50, 99], n_sims=300)
    # Same coin flips per simulation → monotone even sample-wise.
    assert s1 <= s2 <= s3


def test_sim_salts_disjoint_from_sketches():
    # The oracle never reuses the sketch coin flips.
    key = np.uint64(12345)
    from repro.hashing import SALT_SKETCH

    a = u01(key, SALT_SIM + 0)
    b = u01(key, SALT_SKETCH + 0)
    assert a != b


def test_spread_once_deterministic():
    csr = build_csr(erdos_renyi(80, 200, seed=5), n=80)
    probs = consistent_probs(csr, 0.3)
    seeds = np.array([1, 2])
    assert _spread_once(csr, probs, seeds, 7) == _spread_once(csr, probs, seeds, 7)
