"""Regenerate Table II (algorithm runtimes with IDOrd / DegOrd).

Run: ``spark-submit jobs/table2.py`` (or ``python jobs/table2.py``). The
enumeration kernels are single-machine (as in the paper); pass
``--datasets name1,name2`` to restrict.
"""
import argparse

from repro.experiments import table2
from repro.experiments.runner import format_table

COLUMNS = [
    "algorithm", "ordering", "dataset",
    "prune_s", "search_s", "total_s", "n_results", "paper_s",
]


def main(datasets: list[str] | None = None) -> list[dict]:
    rows = table2.rows(datasets)
    print(format_table(rows, COLUMNS))
    return rows


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", default=None, help="comma-separated subset")
    args = ap.parse_args()
    main(args.datasets.split(",") if args.datasets else None)
