"""Distributed pipeline benchmark: Spark pruning + branch-parallel search."""
from repro.core.cfcore import cfcore_spark
from repro.core.distributed import enumerate_df
from repro.experiments.datasets import DATASETS, load


def test_bench_distributed_pipeline(benchmark, spark):
    d = DATASETS["youtube-lite"]
    g = load("youtube-lite")

    def run():
        gp = cfcore_spark(spark, g, d.alpha_s, d.beta_s)
        return enumerate_df(spark, gp, d.alpha_s, d.beta_s, d.delta).count()

    n = benchmark.pedantic(run, rounds=2, iterations=1)
    assert n > 0
