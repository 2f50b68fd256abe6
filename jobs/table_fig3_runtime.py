"""Figure 3 analog: runtimes of all hierarchical methods per data set.

Sequential rows: PMFG-DBHT (with the paper's timeouts on the large sets),
SEQ-TDBHT. Parallel rows: PAR-TDBHT-1, PAR-TDBHT-10, COMP, AVG, plus
K-MEANS / K-MEANS-S for context (as in Section VII-A).

Usage: spark-submit jobs/table_fig3_runtime.py [dataset ids...]
"""
import sys

from repro.bench import (get_spark, markdown_table, prepare, run_kmeans,
                         run_kmeans_s, run_linkage, run_par_tdbht,
                         run_pmfg_dbht, run_seq_tdbht, write_result)
from repro.datasets import load_ucr_lite

DEFAULT_DATASETS = [11, 15, 6, 8, 17, 18]
PMFG_BUDGET_S = 300.0


def main(dataset_ids):
    spark = get_spark()
    rows = []
    for did in dataset_ids:
        ds = load_ucr_lite(did, seed=0)
        S, D, k = prepare(ds)
        results = {}
        # the paper's PMFG times out on its three largest sets; skip the
        # doomed scans beyond n=350 and report the timeout directly
        results["PMFG-DBHT(seq)"] = (
            run_pmfg_dbht(ds, S, D, k, time_budget_s=PMFG_BUDGET_S)
            if ds.n <= 350 else None
        )
        results["SEQ-TDBHT(seq)"] = run_seq_tdbht(ds, S, D, k)
        results["PAR-TDBHT-1"] = run_par_tdbht(spark, ds, S, D, k, prefix=1)
        results["PAR-TDBHT-10"] = run_par_tdbht(spark, ds, S, D, k, prefix=10)
        results["COMP"] = run_linkage(ds, S, D, k, "complete")
        results["AVG"] = run_linkage(ds, S, D, k, "average")
        results["K-MEANS"] = run_kmeans(ds, k)
        results["K-MEANS-S"] = run_kmeans_s(ds, k, beta=min(ds.n - 1, 8 * k))
        for label, r in results.items():
            if r is None:
                rows.append((did, ds.name, ds.n, label, "timeout", "-"))
            else:
                rows.append((did, ds.name, ds.n, label,
                             round(r["time"], 3), round(r["ari"], 3)))
    table = markdown_table(["ID", "dataset", "n", "method", "time_s", "ARI"],
                           rows)
    write_result("table_fig3_runtime.md",
                 "# Fig. 3 (runtimes per method and data set)\n\n" + table)
    spark.stop()


if __name__ == "__main__":
    ids = [int(a) for a in sys.argv[1:]] or DEFAULT_DATASETS
    main(ids)
