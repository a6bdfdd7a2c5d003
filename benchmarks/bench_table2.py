"""Table II benchmark: the four enumeration algorithms under both orderings.

The full Table II grid is produced by ``jobs/table2.py``; this benchmark
tracks the same cells on the two fastest datasets so regressions in any
algorithm/ordering pair are caught. The shape claims (++ faster than base,
DegOrd no slower than IDOrd) are reported in EXPERIMENTS.md.
"""
import pytest

from repro.core.bsfbc import search_bsfbc
from repro.core.cfcore import bcfcore, cfcore
from repro.core.ssfbc import search_ssfbc
from repro.experiments.datasets import DATASETS, load

BENCH_DATASETS = ["youtube-lite", "dblp-lite"]


def _pruned(name, model):
    d = DATASETS[name]
    g = load(name)
    if model == "ssfbc":
        return cfcore(g, d.alpha_s, d.beta_s), d.alpha_s, d.beta_s, d.delta
    return bcfcore(g, d.alpha_b, d.beta_b), d.alpha_b, d.beta_b, d.delta


@pytest.mark.parametrize("dataset", BENCH_DATASETS)
@pytest.mark.parametrize("ordering", ["id", "deg"])
@pytest.mark.parametrize(
    "algo,model,engine",
    [
        ("FairBCEM", "ssfbc", "bcem"),
        ("FairBCEM++", "ssfbc", "bcem_pp"),
        ("BFairBCEM", "bsfbc", "bcem"),
        ("BFairBCEM++", "bsfbc", "bcem_pp"),
    ],
)
def test_bench_table2_cell(benchmark, dataset, ordering, algo, model, engine):
    gp, alpha, beta, delta = _pruned(dataset, model)
    search = search_ssfbc if model == "ssfbc" else search_bsfbc

    def run():
        return search(gp, alpha, beta, delta, algorithm=engine, ordering=ordering)

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    assert len(res) > 0
