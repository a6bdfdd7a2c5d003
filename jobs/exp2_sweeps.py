"""Regenerate Exp-2/Exp-3 (Figs. 2 and 5 as tables): runtime vs alpha/beta/delta.

Run: ``python jobs/exp2_sweeps.py [--dataset dblp-lite]``. NSF/BNSF are
included on the chosen dataset (the paper reports them on DBLP only).
"""
import argparse

from repro.experiments import sweeps
from repro.experiments.runner import format_table

COLUMNS = [
    "dataset", "model", "algorithm", "varied",
    "alpha", "beta", "delta", "time_s", "n_results",
]


def main(dataset: str = "dblp-lite") -> list[dict]:
    rows = sweeps.sweep(dataset, "ssfbc", include_nsf=True)
    rows += sweeps.sweep(dataset, "bsfbc", include_nsf=True)
    print(format_table(rows, COLUMNS))
    return rows


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="dblp-lite")
    main(ap.parse_args().dataset)
