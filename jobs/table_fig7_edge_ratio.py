"""Figure 7 + Section VII-B text: edge-weight-sum ratios.

Ratio of each prefix-TMFG's edge weight sum to (a) the exact sequential
TMFG (prefix=1, the figure's baseline) and (b) the PMFG where feasible
(the text's 92.1-100.3% band).

Usage: spark-submit jobs/table_fig7_edge_ratio.py [dataset ids...]
"""
import sys

from repro.bench import markdown_table, prepare, write_result
from repro.core.pmfg import pmfg
from repro.core.tmfg import tmfg
from repro.datasets import UCR_LITE, load_ucr_lite

PREFIXES = [1, 2, 5, 10, 30, 50, 200]
PMFG_MAX_N = 200
PMFG_BUDGET_S = 300.0


def main(dataset_ids):
    rows = []
    for did in dataset_ids:
        ds = load_ucr_lite(did, seed=0)
        S, D, k = prepare(ds)
        w = {p: tmfg(S, prefix=p).edge_weight_sum(S) for p in PREFIXES}
        base = w[1]
        pm_edges = (pmfg(S, time_budget_s=PMFG_BUDGET_S)
                    if ds.n <= PMFG_MAX_N else None)
        if pm_edges is not None:
            wp = float(S[pm_edges[:, 0], pm_edges[:, 1]].sum())
            pm_ratios = [round(w[p] / wp, 4) for p in PREFIXES]
        else:
            pm_ratios = ["-"] * len(PREFIXES)
        rows.append((did, ds.name, "vs SEQ-TMFG",
                     *[round(w[p] / base, 4) for p in PREFIXES]))
        rows.append((did, ds.name, "vs PMFG", *pm_ratios))
    table = markdown_table(
        ["ID", "dataset", "baseline"] + [f"p={p}" for p in PREFIXES], rows)
    write_result("table_fig7_edge_ratio.md",
                 "# Fig. 7 (edge weight sum ratios)\n\n" + table)


if __name__ == "__main__":
    ids = [int(a) for a in sys.argv[1:]] or sorted(UCR_LITE)
    main(ids)
