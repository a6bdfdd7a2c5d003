"""Exp-1 benchmark: FCore / CFCore / BFCore / BCFCore pruning cost."""
import pytest

from repro.core.cfcore import bcfcore, cfcore
from repro.core.fcore import bfcore, fcore
from repro.experiments.datasets import DATASETS, load

DATASET = "imdb-lite"


@pytest.mark.parametrize("technique", [fcore, cfcore, bfcore, bcfcore])
def test_bench_pruning(benchmark, technique):
    d = DATASETS[DATASET]
    g = load(DATASET)
    out = benchmark.pedantic(
        lambda: technique(g, d.alpha_s, d.beta_s), rounds=2, iterations=1
    )
    assert out.n_u < g.n_u  # pruning must actually prune here
