"""Regenerate Exp-5 (Fig. 7 as a table): runtime vs edge fraction.

Run: ``python jobs/exp5_scalability.py [--dataset dblp-lite]``.
"""
import argparse

from repro.experiments import scalability
from repro.experiments.runner import format_table

COLUMNS = [
    "dataset", "fraction", "n_edges",
    "FairBCEM_s", "FairBCEMpp_s", "BFairBCEM_s", "BFairBCEMpp_s",
]


def main(dataset: str = "dblp-lite") -> list[dict]:
    rows = scalability.sweep(dataset)
    print(format_table(rows, COLUMNS))
    return rows


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="dblp-lite")
    main(ap.parse_args().dataset)
