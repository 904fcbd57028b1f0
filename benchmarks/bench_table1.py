"""Benchmark for Table 1 — dataset generation + Spark stats.

Times the synthetic-dataset substitutes (generation and the Spark
aggregation producing the |V| / |E| / |L_V| stats that reproduce Table 1).
Run ``spark-submit jobs/table1_datasets.py`` for the full table.
"""
import pytest

from repro.graphs.generators import DATASETS, generate
from repro.graphs.model import edges_df, vertices_df

SCALE = 2_000


@pytest.mark.parametrize("name", list(DATASETS))
def test_generate_dataset(benchmark, name):
    g = benchmark(lambda: generate(name, scale=SCALE))
    assert g.n_vertices > 0


def test_table1_stats_via_spark(benchmark, spark):
    from pyspark.sql import functions as F

    g = generate("dblp", scale=SCALE)

    def stats():
        v = vertices_df(spark, g)
        e = edges_df(spark, g)
        return (
            v.count(),
            e.count(),
            v.agg(F.countDistinct("label").alias("n")).collect()[0]["n"],
        )

    n_v, n_e, n_l = benchmark.pedantic(stats, rounds=3, iterations=1)
    assert n_v == g.n_vertices and n_e == g.n_edges and n_l == 8
