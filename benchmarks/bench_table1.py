"""Table I benchmark: dataset generation + distributed statistics/pruning."""
import pytest

from repro.core.fcore_df import fcore_edges
from repro.experiments import table1
from repro.experiments.datasets import DATASETS, load
from repro.graph.generators import planted_bipartite


@pytest.mark.parametrize("name", list(DATASETS))
def test_bench_generate(benchmark, name):
    spec = DATASETS[name]
    benchmark.pedantic(
        lambda: planted_bipartite(spec.spec, seed=spec.seed), rounds=2, iterations=1
    )


def test_bench_table1_stats(benchmark, spark):
    load("youtube-lite")  # warm the cache so the bench isolates the stats query
    benchmark.pedantic(lambda: table1.stats_row("youtube-lite", spark), rounds=3, iterations=1)


def test_bench_distributed_fcore(benchmark, spark):
    d = DATASETS["youtube-lite"]
    g = load("youtube-lite")
    edges, _ua, v_attrs = g.to_spark(spark)
    edges = edges.cache()
    edges.count()

    def run():
        return fcore_edges(edges, v_attrs, d.alpha_s, d.beta_s, len(g.attrs_v)).count()

    benchmark.pedantic(run, rounds=3, iterations=1)
