"""Exp-4 benchmark: counting maximal bicliques vs SSFBC/BSFBC results."""
import pytest

from repro.experiments import counts
from repro.experiments.datasets import DATASETS


def test_bench_counts_row(benchmark):
    d = DATASETS["youtube-lite"]
    row = benchmark.pedantic(
        lambda: counts.count_row("youtube-lite", d.alpha_b, d.beta_b, d.delta, "default"),
        rounds=2,
        iterations=1,
    )
    assert row["n_ssfbc"] >= row["n_maximal_biclique_s"]
