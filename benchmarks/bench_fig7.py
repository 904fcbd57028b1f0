"""Benchmark for the Fig. 7 experiment — one full relative-ipt cell.

Each benchmark runs one (dataset, BFS, k=8) experiment end-to-end: four
partitioners + Spark SQL workload execution, and asserts the paper's
qualitative orderings (streaming systems beat Hash; Loom beats its LDG
fallback). ``spark-submit jobs/fig7_relative_ipt.py`` regenerates the
full table at experiment scale.
"""
import pytest

from repro.eval.harness import run_experiment

SCALE = 2_000


@pytest.mark.parametrize("name", ["dblp", "provgen", "musicbrainz", "lubm"])
def test_fig7_cell(benchmark, spark, name):
    rows = benchmark.pedantic(
        lambda: run_experiment(spark, name, "bfs", 8, scale=SCALE),
        rounds=1,
        iterations=1,
    )
    by = {r.system: r for r in rows}
    assert by["hash"].pct_of_hash == pytest.approx(100.0)
    for s in ("ldg", "fennel", "loom"):
        assert by[s].pct_of_hash < 100.0
