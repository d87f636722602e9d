"""Unit tests for the deterministic hash sampler (fusion trick)."""
import numpy as np
import pytest

from repro.hashing import (
    SALT_PROB,
    SALT_RR,
    SALT_SIM,
    SALT_SKETCH,
    edge_key,
    splitmix64,
    u01,
)


def test_splitmix_deterministic():
    x = np.arange(1000, dtype=np.uint64)
    assert np.array_equal(splitmix64(x), splitmix64(x))


def test_splitmix_scalar_matches_vector():
    xs = np.array([0, 1, 2, 12345, 2**63], dtype=np.uint64)
    vec = splitmix64(xs)
    for i, x in enumerate(xs):
        assert splitmix64(int(x)) == vec[i]


def test_splitmix_no_collisions_small_range():
    out = splitmix64(np.arange(100_000, dtype=np.uint64))
    assert len(np.unique(out)) == 100_000


def test_splitmix_avalanche():
    # Flipping one input bit flips ~half the output bits on average.
    x = np.arange(1, 2049, dtype=np.uint64)
    a = splitmix64(x)
    b = splitmix64(x ^ np.uint64(1))
    flipped = np.array(
        [bin(int(av) ^ int(bv)).count("1") for av, bv in zip(a, b)]
    )
    assert 28 < flipped.mean() < 36


@pytest.mark.parametrize("u,v", [(0, 1), (5, 3), (1000, 17), (2**31, 7)])
def test_edge_key_symmetric(u, v):
    assert edge_key(u, v) == edge_key(v, u)


def test_edge_key_distinct_edges():
    us = np.repeat(np.arange(200), 200)
    vs = np.tile(np.arange(200), 200)
    mask = us < vs
    keys = edge_key(us[mask], vs[mask])
    assert len(np.unique(keys)) == mask.sum()


def test_u01_range_and_mean():
    keys = splitmix64(np.arange(50_000, dtype=np.uint64))
    x = u01(keys, 3)
    assert x.min() >= 0.0 and x.max() < 1.0
    assert abs(x.mean() - 0.5) < 0.01
    assert abs(x.std() - (1 / 12) ** 0.5) < 0.01


def test_u01_deterministic():
    keys = splitmix64(np.arange(100, dtype=np.uint64))
    assert np.array_equal(u01(keys, 42), u01(keys, 42))


@pytest.mark.parametrize("s1,s2", [(0, 1), (5, 6), (SALT_SKETCH, SALT_SIM)])
def test_u01_salts_independent(s1, s2):
    keys = splitmix64(np.arange(20_000, dtype=np.uint64))
    a, b = u01(keys, s1), u01(keys, s2)
    assert abs(np.corrcoef(a, b)[0, 1]) < 0.03


def test_salt_streams_disjoint():
    salts = [SALT_SKETCH, SALT_SIM, SALT_RR, SALT_PROB]
    assert len(set(salts)) == 4
    # A few thousand logical ids never cross streams.
    assert min(abs(a - b) for a in salts for b in salts if a != b) > 60_000


@pytest.mark.parametrize("p", [0.02, 0.1, 0.3, 0.5])
def test_sampling_rate_matches_p(p):
    keys = splitmix64(np.arange(40_000, dtype=np.uint64))
    rate = (u01(keys, 7) < p).mean()
    assert abs(rate - p) < 0.01


def test_sampling_independent_across_sketches():
    # The same edge is sampled independently in different sketches.
    keys = splitmix64(np.arange(40_000, dtype=np.uint64))
    a = u01(keys, SALT_SKETCH + 0) < 0.5
    b = u01(keys, SALT_SKETCH + 1) < 0.5
    joint = (a & b).mean()
    assert abs(joint - 0.25) < 0.01
