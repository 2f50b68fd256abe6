"""Spark TMFG: bit-identical to the driver reference for every prefix."""
import numpy as np
import pytest

from repro.core.tmfg import tmfg
from repro.spark.tmfg_spark import tmfg_spark


def rand_sim(n, seed):
    rng = np.random.default_rng(seed)
    S = rng.random((n, n))
    S = (S + S.T) / 2
    np.fill_diagonal(S, 1.0)
    return S


@pytest.mark.parametrize("n,seed,prefix", [
    (30, 0, 1),
    (60, 1, 4),
    (90, 2, 10),
    (60, 3, 1000),  # prefix larger than n
])
def test_identical_to_driver(spark, n, seed, prefix):
    S = rand_sim(n, seed)
    ref = tmfg(S, prefix=prefix)
    got = tmfg_spark(spark, S, prefix=prefix)
    assert np.array_equal(got.edges, ref.edges)
    assert got.rounds == ref.rounds
    assert got.insertions == ref.insertions
    assert got.tree.bubbles == ref.tree.bubbles
    assert got.tree.parent == ref.tree.parent
    assert got.tree.children == ref.tree.children
    assert got.tree.sep_triangle == ref.tree.sep_triangle
    assert got.tree.root == ref.tree.root


def test_partitions_dont_change_result(spark):
    S = rand_sim(50, 4)
    a = tmfg_spark(spark, S, prefix=6, partitions=2)
    b = tmfg_spark(spark, S, prefix=6, partitions=12)
    assert np.array_equal(a.edges, b.edges)
    assert a.insertions == b.insertions


def test_invalid_prefix(spark):
    with pytest.raises(ValueError):
        tmfg_spark(spark, rand_sim(10, 0), prefix=0)
