"""Figure 4 analog: self-relative speedup vs available parallelism.

The paper sweeps thread counts on 48 cores; in local-mode Spark the
equivalent knob is the number of partitions (tasks <= partitions bounds
concurrency). We sweep partitions for several prefix sizes on the largest
data set (Crop-lite) and report speedup relative to 1 partition.

Usage: spark-submit jobs/table_fig4_scalability.py [dataset_id]
"""
import sys

from repro.bench import (get_spark, markdown_table, prepare, run_par_tdbht,
                         write_result)
from repro.datasets import load_ucr_lite

PARTITIONS = [1, 2, 4, 8, 16]
PREFIXES = [1, 50, 200]


def main(did: int):
    spark = get_spark()
    ds = load_ucr_lite(did, seed=0)
    S, D, k = prepare(ds)
    rows = []
    for prefix in PREFIXES:
        base = None
        for parts in PARTITIONS:
            r = run_par_tdbht(spark, ds, S, D, k, prefix=prefix,
                              partitions=parts)
            if base is None:
                base = r["time"]
            rows.append((ds.name, prefix, parts, round(r["time"], 3),
                         round(base / r["time"], 2), r["rounds"],
                         r["spark_tmfg"]))
    table = markdown_table(
        ["dataset", "prefix", "partitions", "time_s", "speedup", "rounds",
         "spark_tmfg"], rows)
    write_result("table_fig4_scalability.md",
                 "# Fig. 4 (speedup vs parallelism)\n\n" + table)
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 17)
