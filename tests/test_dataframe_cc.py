"""Distributed DataFrame connected components vs the local kernel."""
import numpy as np
import pandas as pd
import pytest

from repro.cc.dataframe_cc import dataframe_cc
from repro.cc.local_cc import cc_labels
from repro.graphs.generators import erdos_renyi, grid2d, to_spark_edges


def _compare(spark, edges, n):
    got = dataframe_cc(to_spark_edges(spark, edges)).toPandas()
    want = cc_labels(n, edges[:, 0], edges[:, 1])
    full = np.arange(n)
    full[got["vid"].to_numpy()] = got["label"].to_numpy()
    assert np.array_equal(full, want)
    # Only edge-incident vertices are reported.
    assert set(got["vid"]) == set(edges.ravel().tolist())


@pytest.mark.parametrize("seed,m", [(1, 80), (2, 200), (3, 500)])
def test_matches_local_on_random_graphs(spark, seed, m):
    edges = erdos_renyi(120, m, seed=seed)
    _compare(spark, edges, 120)


def test_grid_long_diameter(spark):
    # Pointer jumping must beat the O(diameter) propagation bound.
    edges = grid2d(4, 40)
    _compare(spark, edges, 160)


def test_two_cliques(spark):
    a = np.array([(i, j) for i in range(5) for j in range(i + 1, 5)])
    b = a + 10
    edges = np.vstack([a, b])
    got = dataframe_cc(to_spark_edges(spark, edges)).toPandas()
    lab = dict(zip(got["vid"], got["label"]))
    assert all(lab[v] == 0 for v in range(5))
    assert all(lab[v] == 10 for v in range(10, 15))


def test_single_edge(spark):
    got = dataframe_cc(
        spark.createDataFrame(pd.DataFrame({"u": [3], "v": [7]}))
    ).toPandas()
    assert dict(zip(got["vid"], got["label"])) == {3: 3, 7: 3}
