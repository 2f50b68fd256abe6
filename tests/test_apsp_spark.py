"""Distributed APSP: matches the driver Dijkstra substrate exactly."""
import numpy as np
import pytest

from repro.core.tmfg import tmfg
from repro.graphs.shortest_paths import apsp
from repro.spark.apsp_spark import apsp_df, apsp_matrix_spark


@pytest.fixture(scope="module")
def graph():
    rng = np.random.default_rng(0)
    n = 40
    S = rng.random((n, n))
    S = (S + S.T) / 2
    t = tmfg(S)
    D = np.sqrt(2 * (1 - np.clip(S, -1, 1)))
    w = D[t.edges[:, 0], t.edges[:, 1]]
    return n, t.edges, w


def test_matches_driver(spark, graph):
    n, edges, w = graph
    expected = apsp(n, edges, w)
    got = apsp_matrix_spark(spark, n, edges, w)
    assert np.allclose(got, expected, atol=0, rtol=0)


def test_df_shape_and_zero_diag(spark, graph):
    n, edges, w = graph
    df = apsp_df(spark, n, edges, w)
    assert df.count() == n * n
    diag = df.filter("src = dst").toPandas()
    assert np.allclose(diag["dist"], 0.0)


def test_symmetric(spark, graph):
    n, edges, w = graph
    M = apsp_matrix_spark(spark, n, edges, w)
    assert np.allclose(M, M.T)


def test_partitions_dont_change_result(spark, graph):
    n, edges, w = graph
    a = apsp_matrix_spark(spark, n, edges, w, partitions=2)
    b = apsp_matrix_spark(spark, n, edges, w, partitions=13)
    assert np.array_equal(a, b)
