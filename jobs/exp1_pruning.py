"""Regenerate Exp-1 (Figs. 3-4 as tables): FCore vs CFCore pruning power.

Run: ``python jobs/exp1_pruning.py [--dataset imdb-lite]``.
"""
import argparse

from repro.experiments import pruning
from repro.experiments.runner import format_table

COLUMNS = [
    "dataset", "side", "varied", "alpha", "beta",
    "n_original", "n_fcore", "n_cfcore", "t_fcore_s", "t_cfcore_s",
]


def main(dataset: str = "imdb-lite") -> list[dict]:
    rows = pruning.sweep(dataset) + pruning.sweep(dataset, bi=True)
    print(format_table(rows, COLUMNS))
    return rows


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="imdb-lite")
    main(ap.parse_args().dataset)
