"""Figure 1 analog: sequential runtime vs clustering quality.

PMFG-DBHT and TMFG-DBHT (sequential) are slower but produce better
clusters than average/complete linkage — the paper's motivating plot,
here as a table over small UCR-lite data sets.

Usage: spark-submit jobs/table_fig1_tradeoff.py
"""
from repro.bench import (markdown_table, prepare, run_linkage, run_pmfg_dbht,
                         run_seq_tdbht, write_result)
from repro.datasets import load_ucr_lite

DATASETS = [11, 15, 9, 12]  # small sets where sequential PMFG is feasible


def main():
    rows = []
    for did in DATASETS:
        ds = load_ucr_lite(did, seed=0)
        S, D, k = prepare(ds)
        pm = run_pmfg_dbht(ds, S, D, k, time_budget_s=600)
        tm = run_seq_tdbht(ds, S, D, k)
        comp = run_linkage(ds, S, D, k, "complete")
        avg = run_linkage(ds, S, D, k, "average")
        for label, r in (("PMFG-DBHT", pm), ("TMFG-DBHT", tm),
                         ("COMP", comp), ("AVG", avg)):
            if r is None:
                rows.append((did, ds.name, label, "timeout", "-"))
            else:
                rows.append((did, ds.name, label, r["time"], r["ari"]))
    table = markdown_table(["ID", "dataset", "method", "time_s", "ARI"], rows)
    write_result("table_fig1_tradeoff.md",
                 "# Fig. 1 (sequential runtime vs quality)\n\n" + table)


if __name__ == "__main__":
    main()
