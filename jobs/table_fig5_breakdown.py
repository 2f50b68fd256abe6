"""Figure 5 analog: runtime breakdown across pipeline steps on ECG5000.

Steps: tmfg (Algorithm 1), apsp, bubble-tree (directions + assignments),
hierarchy (complete-linkage levels) — sequential vs Spark, for several
prefix sizes.

Usage: spark-submit jobs/table_fig5_breakdown.py [dataset_id]
"""
import sys

from repro.bench import (get_spark, markdown_table, prepare, run_par_tdbht,
                         run_seq_tdbht, write_result)
from repro.datasets import load_ucr_lite

PREFIXES = [1, 10, 50]


def main(did: int):
    spark = get_spark()
    ds = load_ucr_lite(did, seed=0)
    S, D, k = prepare(ds)
    # warm up the JVM / Python workers so the first measured row isn't
    # inflated by one-time startup costs
    run_par_tdbht(spark, ds, S, D, k, prefix=50)
    rows = []
    for prefix in PREFIXES:
        seq = run_seq_tdbht(ds, S, D, k, prefix=prefix)
        par = run_par_tdbht(spark, ds, S, D, k, prefix=prefix)
        for mode, r in (("seq", seq), ("par", par)):
            s = r["steps"]
            rows.append((ds.name, mode, prefix,
                         round(s["tmfg"], 3), round(s["apsp"], 3),
                         round(s["bubble-tree"], 3), round(s["hierarchy"], 3),
                         round(sum(s.values()), 3)))
    table = markdown_table(
        ["dataset", "mode", "prefix", "tmfg", "apsp", "bubble-tree",
         "hierarchy", "total"], rows)
    write_result("table_fig5_breakdown.md",
                 "# Fig. 5 (runtime breakdown per step)\n\n" + table)
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 6)
