"""Regenerate Exp-4 (Fig. 6 as a table): counts of maximal bicliques vs fair bicliques.

Run: ``python jobs/exp4_counts.py [--dataset wikicat-lite]``.
"""
import argparse

from repro.experiments import counts
from repro.experiments.runner import format_table

COLUMNS = [
    "dataset", "varied", "alpha", "beta", "delta",
    "n_maximal_biclique_s", "n_ssfbc", "n_maximal_biclique_b", "n_bsfbc",
]


def main(dataset: str = "wikicat-lite") -> list[dict]:
    rows = counts.sweep(dataset)
    print(format_table(rows, COLUMNS))
    return rows


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="wikicat-lite")
    main(ap.parse_args().dataset)
