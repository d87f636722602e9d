"""Benchmark for paper Table 3 (graph info + influence estimation).

Times the two phases that produce a Table 3 row at bench scale: PaC-IM
seed selection and the distributed Monte-Carlo influence estimate.
Full-scale rows: ``python jobs/table3_graphs.py`` (see EXPERIMENTS.md).
"""
import pytest

from repro.baselines.simulate import estimate_spread
from repro.core.pacim import run_pacim
from repro.graphs.csr import build_csr
from repro.graphs.generators import rmat
from repro.graphs.probs import consistent_probs


@pytest.fixture(scope="module")
def graph():
    csr = build_csr(rmat(2048, 16000, seed=41), n=2048)
    return csr, consistent_probs(csr, 0.1)


def bench_seed_selection(spark, csr, probs):
    return run_pacim(None, csr, probs, R=32, alpha=1.0, k=20, backend="local")


def test_table3_seed_selection(benchmark, spark, graph):
    csr, probs = graph
    res = benchmark.pedantic(
        bench_seed_selection, args=(spark, csr, probs),
        rounds=1, iterations=1,
    )
    benchmark.extra_info["est_influence"] = res["est_influence"]
    assert len(res["seeds"]) == 20


def test_table3_mc_influence(benchmark, spark, graph):
    csr, probs = graph
    res = run_pacim(None, csr, probs, R=32, alpha=1.0, k=20, backend="local")
    infl = benchmark.pedantic(
        estimate_spread, args=(spark, csr, probs, res["seeds"]),
        kwargs=dict(n_sims=400), rounds=1, iterations=1,
    )
    benchmark.extra_info["influence_mc"] = infl
    assert infl >= 20
