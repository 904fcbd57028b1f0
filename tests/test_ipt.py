"""Tests for workload-level ipt accounting (the paper's quality measure)."""
import duckdb
import pytest

from repro.eval.ipt import QueryIpt, WorkloadIpt, partition_tables, workload_ipt
from repro.eval.matcher import ipt_sql
from repro.graphs.generators import provgen_lite
from repro.graphs.model import LabeledGraph
from repro.partitioners.hash_part import hash_vertex
from repro.workloads.queries import _path, workload


@pytest.fixture(scope="module")
def small_graph():
    return provgen_lite(scale=300)


class TestDataclasses:
    def test_query_ipt_weighting(self):
        q = QueryIpt(n_matches=10, n_ipt=4, frequency=0.5)
        assert q.weighted_ipt == pytest.approx(2.0)

    def test_workload_total(self):
        w = WorkloadIpt(
            (QueryIpt(5, 10, 0.4), QueryIpt(3, 20, 0.6))
        )
        assert w.total == pytest.approx(0.4 * 10 + 0.6 * 20)
        assert w.total_matches == 8


class TestWorkloadIpt:
    def test_single_partition_zero_total(self, spark, small_graph):
        asg = {v: 0 for v in small_graph.labels}
        result = workload_ipt(spark, small_graph, asg, workload("provgen"))
        assert result.total == 0.0
        assert result.total_matches > 0

    def test_hash_partitioning_positive(self, spark, small_graph):
        asg = {v: hash_vertex(v, 4) for v in small_graph.labels}
        result = workload_ipt(spark, small_graph, asg, workload("provgen"))
        assert result.total > 0

    def test_matches_invariant_under_partitioning(self, spark, small_graph):
        """Embedding counts depend only on the graph, not the partitioning."""
        wl = workload("provgen")
        r1 = workload_ipt(spark, small_graph, {v: 0 for v in small_graph.labels}, wl)
        r2 = workload_ipt(
            spark, small_graph, {v: hash_vertex(v, 8) for v in small_graph.labels}, wl
        )
        assert r1.total_matches == r2.total_matches

    def test_more_partitions_more_ipt(self, spark, small_graph):
        """Sec. 5.2: increasing k increases the probability any edge is
        cut, so hash ipt grows with k."""
        wl = workload("provgen")
        totals = []
        for k in (2, 8, 32):
            asg = {v: hash_vertex(v, k) for v in small_graph.labels}
            totals.append(workload_ipt(spark, small_graph, asg, wl).total)
        assert totals[0] < totals[1] < totals[2]

    def test_spark_agrees_with_duckdb(self, spark, small_graph):
        """The full Spark accounting equals DuckDB running the same SQL."""
        wl = workload("provgen")
        asg = {v: hash_vertex(v, 4) for v in small_graph.labels}
        spark_result = workload_ipt(spark, small_graph, asg, wl)
        _, dedges = partition_tables(small_graph, asg)
        con = duckdb.connect()
        con.register("dedges", dedges)
        for q, (pat, freq) in zip(spark_result.per_query, wl):
            n, c = con.execute(ipt_sql(pat)).fetchone()
            assert q.n_matches == n
            assert q.n_ipt == c
            assert q.frequency == freq
        con.close()

    def test_handmade_graph_exact_value(self, spark):
        g = LabeledGraph({0: "a", 1: "b", 2: "c"}, [(0, 1), (1, 2)])
        wl = [(_path(["a", "b", "c"]), 1.0)]
        cut_asg = {0: 0, 1: 0, 2: 1}
        result = workload_ipt(spark, g, cut_asg, wl)
        assert result.total == pytest.approx(1.0)
        assert result.total_matches == 1
