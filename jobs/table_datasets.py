"""Table II analog: the UCR-lite data set registry summary.

Usage: spark-submit jobs/table_datasets.py   (no Spark actually needed)
"""
from repro.bench import markdown_table, write_result
from repro.datasets import UCR_LITE, load_ucr_lite


def main():
    rows = []
    for did in sorted(UCR_LITE):
        name, n, length, classes, noise, shared, out_frac = UCR_LITE[did]
        ds = load_ucr_lite(did, seed=0)
        rows.append((did, name, ds.n, ds.length, ds.n_classes,
                     noise, shared, out_frac))
    table = markdown_table(
        ["ID", "Name", "n", "L", "#classes", "noise", "shared", "outliers"],
        rows,
    )
    write_result("table_datasets.md", "# Table II (UCR-lite registry)\n\n" + table)


if __name__ == "__main__":
    main()
