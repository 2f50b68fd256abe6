"""Benchmark: TMFG construction alone vs prefix size (the Figure 5 "tmfg"
bars), driver reference and Spark dataflow."""
import pytest

from repro.bench import prepare
from repro.core.tmfg import tmfg
from repro.datasets import load_ucr_lite
from repro.spark.tmfg_spark import tmfg_spark

_CACHE = {}


def get_S():
    if "S" not in _CACHE:
        ds = load_ucr_lite(6, seed=0)
        S, _, _ = prepare(ds)
        _CACHE["S"] = S
    return _CACHE["S"]


@pytest.mark.parametrize("prefix", [1, 10, 50, 200])
def test_tmfg_driver(benchmark, prefix):
    S = get_S()
    t = benchmark.pedantic(lambda: tmfg(S, prefix=prefix), rounds=1,
                           iterations=1)
    benchmark.extra_info["rounds"] = t.rounds


@pytest.mark.parametrize("prefix", [10, 50, 200])
def test_tmfg_spark(benchmark, spark, prefix):
    S = get_S()
    out = {}

    def run():
        out["t"] = tmfg_spark(spark, S, prefix=prefix)

    benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["rounds"] = out["t"].rounds
