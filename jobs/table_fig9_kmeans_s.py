"""Figure 9 analog: K-MEANS-S sensitivity to the number of nearest
neighbors beta — per data set, the ARI across the beta sweep (min / max /
range demonstrates the oscillation the paper reports).

Usage: spark-submit jobs/table_fig9_kmeans_s.py [dataset ids...]
"""
import sys

import numpy as np

from repro.bench import beta_grid, markdown_table, run_kmeans_s, write_result
from repro.datasets import load_ucr_lite

DEFAULT_DATASETS = [2, 6, 8, 11, 14, 15]


def main(dataset_ids):
    rows = []
    for did in dataset_ids:
        ds = load_ucr_lite(did, seed=0)
        r = run_kmeans_s(ds, ds.n_classes)  # sweep; includes per-beta scores
        scores = r["scores"]
        vals = np.array(list(scores.values()))
        rows.append((did, ds.name,
                     " ".join(str(b) for b in beta_grid(ds.n)),
                     " ".join(f"{v:.2f}" for v in vals),
                     round(vals.min(), 3), round(vals.max(), 3),
                     round(vals.max() - vals.min(), 3), r["beta"]))
    table = markdown_table(
        ["ID", "dataset", "betas", "ARIs", "min", "max", "range", "best_beta"],
        rows)
    write_result("table_fig9_kmeans_s.md",
                 "# Fig. 9 (K-MEANS-S beta sensitivity)\n\n" + table)


if __name__ == "__main__":
    ids = [int(a) for a in sys.argv[1:]] or DEFAULT_DATASETS
    main(ids)
