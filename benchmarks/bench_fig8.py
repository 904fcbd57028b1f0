"""Benchmark for the Fig. 8 experiment — relative ipt across k.

Runs the k-sweep at reduced scale for k in {2, 8, 32} on one dataset and
asserts that absolute hash ipt grows with k (Sec. 5.2).
``spark-submit jobs/fig8_k_sweep.py`` regenerates the full table.
"""
import pytest

from repro.eval.harness import run_experiment
from repro.graphs.generators import generate

SCALE = 2_000


@pytest.mark.parametrize("k", [2, 8, 32])
def test_fig8_cell(benchmark, spark, k):
    graph = generate("dblp", scale=SCALE)
    rows = benchmark.pedantic(
        lambda: run_experiment(spark, "dblp", "bfs", k, graph=graph),
        rounds=1,
        iterations=1,
    )
    by = {r.system: r for r in rows}
    assert by["loom"].pct_of_hash < 100.0
    # the monotone-in-k property itself is asserted in tests/test_harness.py
