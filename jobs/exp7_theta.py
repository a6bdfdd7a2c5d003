"""Regenerate Exp-7 (Figs. 11-12 as tables): proportion models vs theta.

Run: ``python jobs/exp7_theta.py [--dataset youtube-lite]``.
"""
import argparse

from repro.experiments import theta
from repro.experiments.runner import format_table

COLUMNS = ["dataset", "theta", "n_pssfbc", "t_pssfbc_s", "n_pbsfbc", "t_pbsfbc_s"]


def main(dataset: str = "youtube-lite") -> list[dict]:
    rows = theta.sweep(dataset)
    print(format_table(rows, COLUMNS))
    return rows


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="youtube-lite")
    main(ap.parse_args().dataset)
