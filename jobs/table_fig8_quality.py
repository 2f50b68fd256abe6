"""Figure 8 analog: clustering quality (ARI) of every method on every
UCR-lite data set. PMFG-DBHT runs only where feasible (the paper reports
it timing out on data sets 8, 17, 18).

Driver implementations throughout (identical results to the Spark path,
tested) so the full sweep is tractable.

Usage: spark-submit jobs/table_fig8_quality.py [dataset ids...]
"""
import sys

from repro.bench import (markdown_table, prepare, run_kmeans, run_kmeans_s,
                         run_linkage, run_pmfg_dbht, run_seq_tdbht,
                         write_result)
from repro.datasets import UCR_LITE, load_ucr_lite

PMFG_MAX_N = 200
PMFG_BUDGET_S = 300.0


def main(dataset_ids):
    rows = []
    for did in dataset_ids:
        ds = load_ucr_lite(did, seed=0)
        S, D, k = prepare(ds)
        pm = (run_pmfg_dbht(ds, S, D, k, time_budget_s=PMFG_BUDGET_S)
              if ds.n <= PMFG_MAX_N else None)
        t1 = run_seq_tdbht(ds, S, D, k, prefix=1)
        t10 = run_seq_tdbht(ds, S, D, k, prefix=10)
        comp = run_linkage(ds, S, D, k, "complete")
        avg = run_linkage(ds, S, D, k, "average")
        km = run_kmeans(ds, k)
        kms = run_kmeans_s(ds, k)  # best beta over the sweep, per the paper
        rows.append((
            did, ds.name, ds.n, k,
            "-" if pm is None else round(pm["ari"], 3),
            round(t1["ari"], 3), round(t10["ari"], 3),
            round(comp["ari"], 3), round(avg["ari"], 3),
            round(km["ari"], 3), round(kms["ari"], 3), kms["beta"],
        ))
    table = markdown_table(
        ["ID", "dataset", "n", "k", "PMFG-DBHT", "TDBHT-1", "TDBHT-10",
         "COMP", "AVG", "K-MEANS", "K-MEANS-S", "best_beta"], rows)
    write_result("table_fig8_quality.md",
                 "# Fig. 8 (ARI of all methods)\n\n" + table)


if __name__ == "__main__":
    ids = [int(a) for a in sys.argv[1:]] or sorted(UCR_LITE)
    main(ids)
