"""Benchmark: Figure 3 runtime table (per data set x method).

Each benchmark is one full clustering run (rounds=1 — these are
multi-second end-to-end jobs); the ARI lands in extra_info so the
benchmark table doubles as the quality table.
"""
import pytest

from repro.bench import (prepare, run_kmeans, run_linkage, run_par_tdbht,
                         run_pmfg_dbht, run_seq_tdbht)
from repro.datasets import load_ucr_lite

DATASETS = [11, 15, 6]  # CBF (124), SonyAIBO (98), ECG5000 (334)
_CACHE = {}


def get_ds(did):
    if did not in _CACHE:
        ds = load_ucr_lite(did, seed=0)
        _CACHE[did] = (ds, *prepare(ds))
    return _CACHE[did]


def _bench(benchmark, fn):
    out = {}

    def run():
        out["r"] = fn()

    benchmark.pedantic(run, rounds=1, iterations=1)
    r = out["r"]
    if r is not None:
        benchmark.extra_info["ari"] = round(r["ari"], 3)
    return r


@pytest.mark.parametrize("did", [11, 15])  # PMFG feasible only on small sets
def test_pmfg_dbht(benchmark, did):
    ds, S, D, k = get_ds(did)
    _bench(benchmark, lambda: run_pmfg_dbht(ds, S, D, k, time_budget_s=600))


@pytest.mark.parametrize("did", DATASETS)
def test_seq_tdbht(benchmark, did):
    ds, S, D, k = get_ds(did)
    _bench(benchmark, lambda: run_seq_tdbht(ds, S, D, k))


@pytest.mark.parametrize("did", DATASETS)
def test_par_tdbht_1(benchmark, spark, did):
    ds, S, D, k = get_ds(did)
    _bench(benchmark, lambda: run_par_tdbht(spark, ds, S, D, k, prefix=1))


@pytest.mark.parametrize("did", DATASETS)
def test_par_tdbht_10(benchmark, spark, did):
    ds, S, D, k = get_ds(did)
    _bench(benchmark, lambda: run_par_tdbht(spark, ds, S, D, k, prefix=10))


@pytest.mark.parametrize("did", DATASETS)
@pytest.mark.parametrize("method", ["complete", "average"])
def test_linkage(benchmark, did, method):
    ds, S, D, k = get_ds(did)
    _bench(benchmark, lambda: run_linkage(ds, S, D, k, method))


@pytest.mark.parametrize("did", DATASETS)
def test_kmeans(benchmark, did):
    ds, S, D, k = get_ds(did)
    _bench(benchmark, lambda: run_kmeans(ds, k))
