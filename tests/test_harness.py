"""Integration tests: the full experiment harness (Sec. 5) at test scale.

These assert the *qualitative* shape of the paper's results on small
streams: Hash is the worst partitioning, the streaming heuristics all beat
it, balance respects the configured slack, and the harness plumbing
(timing, relative ipt, row formatting) is sound.
"""
import pytest

from repro.eval.harness import (
    SYSTEMS,
    ExperimentRow,
    build_partitioner,
    default_window,
    format_rows,
    run_experiment,
    run_system,
)
from repro.graphs.generators import generate
from repro.graphs.streams import ordered_stream
from repro.workloads.queries import workload

SCALE = 1200  # small enough for CI, large enough for stable ordering


@pytest.fixture(scope="module")
def dblp_rows(spark):
    return run_experiment(spark, "dblp", "bfs", 4, scale=SCALE)


class TestBuildPartitioner:
    @pytest.mark.parametrize("name", SYSTEMS)
    def test_builds_each_system(self, name):
        g = generate("provgen", scale=200)
        p = build_partitioner(name, 4, g, workload("provgen"))
        assert p.name == name

    def test_unknown_system(self):
        g = generate("provgen", scale=200)
        with pytest.raises(ValueError):
            build_partitioner("metis", 4, g, workload("provgen"))

    def test_default_window_caps(self):
        assert default_window(100_000_000) == 10_000
        assert default_window(400) == 100
        assert default_window(10) == 10


class TestRunSystem:
    def test_times_and_assigns(self):
        g = generate("provgen", scale=400)
        order = ordered_stream(g, "bfs", seed=0)
        run = run_system("ldg", g, order, 4, workload("provgen"))
        assert run.elapsed_s > 0
        assert run.n_edges == g.n_edges
        assert run.ms_per_10k > 0
        seen = {x for e in g.canonical_edges() for x in e}
        assert set(run.assignment) == seen

    def test_loom_window_override(self):
        g = generate("provgen", scale=300)
        order = ordered_stream(g, "bfs", seed=0)
        run = run_system("loom", g, order, 4, workload("provgen"), window=25)
        assert set(run.assignment)  # completed


class TestExperimentShape:
    def test_rows_cover_requested_systems(self, dblp_rows):
        assert [r.system for r in dblp_rows] == list(SYSTEMS)

    def test_hash_is_100_percent(self, dblp_rows):
        hash_row = next(r for r in dblp_rows if r.system == "hash")
        assert hash_row.pct_of_hash == pytest.approx(100.0)

    def test_streaming_partitioners_beat_hash(self, dblp_rows):
        """The paper's headline ordering: every informed partitioner
        produces fewer ipt than Hash."""
        for r in dblp_rows:
            if r.system != "hash":
                assert r.pct_of_hash < 100.0, f"{r.system} not better than hash"

    def test_loom_beats_ldg(self, dblp_rows):
        """Loom's workload-awareness must pay off against its own
        fallback heuristic."""
        loom = next(r for r in dblp_rows if r.system == "loom")
        ldg = next(r for r in dblp_rows if r.system == "ldg")
        assert loom.ipt <= ldg.ipt * 1.05

    def test_balance_within_slack(self, dblp_rows):
        for r in dblp_rows:
            if r.system == "hash":
                continue  # hash is only balanced in expectation
            assert r.imbalance <= 1.1 + 0.05

    def test_matches_identical_across_systems(self, dblp_rows):
        assert len({r.n_matches for r in dblp_rows}) == 1

    def test_loom_slower_than_ldg_fennel(self, dblp_rows):
        """Table 2's shape: hash fastest, Loom slowest (2-7x Fennel)."""
        t = {r.system: r.ms_per_10k for r in dblp_rows}
        assert t["hash"] < t["ldg"]
        assert t["loom"] > t["fennel"]

    def test_format_rows_renders(self, dblp_rows):
        text = format_rows(dblp_rows)
        assert "dblp" in text
        assert "% of hash" in text.splitlines()[0]
        assert len(text.splitlines()) == len(dblp_rows) + 2


class TestOrderAndKVariants:
    def test_random_order_runs(self, spark):
        rows = run_experiment(
            spark, "provgen", "random", 2, scale=600, systems=("hash", "loom")
        )
        assert {r.system for r in rows} == {"hash", "loom"}

    def test_k_sweep_monotone_for_hash(self, spark):
        """Absolute hash ipt grows with k (Sec. 5.2)."""
        g = generate("provgen", scale=600)
        totals = {}
        for k in (2, 8):
            rows = run_experiment(
                spark, "provgen", "bfs", k, graph=g, systems=("hash",)
            )
            totals[k] = rows[0].ipt
        assert totals[2] < totals[8]

    def test_graph_reuse_skips_generation(self, spark):
        g = generate("provgen", scale=500)
        rows = run_experiment(
            spark, "provgen", "bfs", 2, graph=g, systems=("hash",)
        )
        assert rows[0].n_matches > 0

    def test_row_is_dataclass(self):
        r = ExperimentRow("d", "bfs", 2, "hash", 1.0, 100.0, 1.0, 5.0, 10)
        assert r.dataset == "d"
