"""Benchmark: Figure 5 step breakdown on ECG5000-lite.

Per-step wall times (tmfg / apsp / bubble-tree / hierarchy) land in
extra_info for both the sequential and Spark pipelines at several prefix
sizes.
"""
import pytest

from repro.bench import prepare, run_par_tdbht, run_seq_tdbht
from repro.datasets import load_ucr_lite

_CACHE = {}


def get_ds():
    if "ds" not in _CACHE:
        ds = load_ucr_lite(6, seed=0)  # ECG5000-lite, n=334
        _CACHE["ds"] = (ds, *prepare(ds))
    return _CACHE["ds"]


def _bench(benchmark, fn):
    out = {}

    def run():
        out["r"] = fn()

    benchmark.pedantic(run, rounds=1, iterations=1)
    r = out["r"]
    for step, t in r["steps"].items():
        benchmark.extra_info[step] = round(t, 3)
    benchmark.extra_info["rounds"] = r["rounds"]
    return r


@pytest.mark.parametrize("prefix", [1, 10, 50])
def test_seq_breakdown(benchmark, prefix):
    ds, S, D, k = get_ds()
    _bench(benchmark, lambda: run_seq_tdbht(ds, S, D, k, prefix=prefix))


@pytest.mark.parametrize("prefix", [1, 10, 50])
def test_par_breakdown(benchmark, spark, prefix):
    ds, S, D, k = get_ds()
    _bench(benchmark, lambda: run_par_tdbht(spark, ds, S, D, k, prefix=prefix))
