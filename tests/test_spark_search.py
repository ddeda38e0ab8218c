"""Distributed two-phase pipeline vs the pure-Python reference, end-to-end."""
import pytest

from repro.core.motif import MOTIFS
from repro.core.search import count_graph, max_flow_graph, topk_graph
from repro.spark import search as sp
from tests.conftest import (
    py_instance_set,
    random_edges,
    spark_instance_set,
    to_spark_edges,
)

FIG2_EDGES = [(3, 1, 10.0, 10.0), (1, 2, 13.0, 5.0), (1, 2, 15.0, 7.0), (2, 3, 18.0, 20.0)]


class TestFindInstances:
    def test_fig4_instance(self, spark):
        motif = MOTIFS["M(3,3)"]
        df = sp.find_instances(to_spark_edges(spark, FIG2_EDGES), motif, 10, 7)
        rows = df.collect()
        assert len(rows) == 1
        r = rows[0]
        assert (r.v0, r.v1, r.v2) == (3, 1, 2)
        assert r.flow == 10.0
        assert (r.t_start, r.t_end) == (10.0, 18.0)
        assert r.n_interactions == 4

    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("name", ["M(3,2)", "M(3,3)"])
    def test_matches_python_reference(self, spark, seed, name):
        motif = MOTIFS[name]
        edges = random_edges(seed, n_nodes=6, n_edges=35, t_max=40)
        delta, phi = 12.0, 4.0
        got = spark_instance_set(
            sp.find_instances(to_spark_edges(spark, edges), motif, delta, phi),
            motif.n_nodes,
        )
        assert got == py_instance_set(edges, motif, delta, phi)

    @pytest.mark.parametrize("name", ["M(4,3)", "M(4,4)A"])
    def test_matches_python_reference_larger_motifs(self, spark, name):
        motif = MOTIFS[name]
        edges = random_edges(99, n_nodes=6, n_edges=45, t_max=30)
        delta, phi = 15.0, 2.0
        got = spark_instance_set(
            sp.find_instances(to_spark_edges(spark, edges), motif, delta, phi),
            motif.n_nodes,
        )
        assert got == py_instance_set(edges, motif, delta, phi)

    def test_generated_dataset_counts(self, passenger_small):
        from repro.networks.generators import SPECS

        motif = MOTIFS["M(3,2)"]
        spec = SPECS["passenger"]
        edges = [
            (r.src, r.dst, r.t, r.f) for r in passenger_small.collect()
        ]
        expected = count_graph(edges, motif, spec.delta_default, spec.phi_default)
        got = sp.count_instances(
            passenger_small, motif, spec.delta_default, spec.phi_default
        )
        assert got == expected
        assert got > 0

    def test_empty_result(self, spark):
        motif = MOTIFS["M(3,3)"]
        df = sp.find_instances(to_spark_edges(spark, FIG2_EDGES), motif, 10, 100.0)
        assert df.count() == 0

    def test_phi_monotonicity(self, spark):
        motif = MOTIFS["M(3,2)"]
        edges = random_edges(7, n_nodes=6, n_edges=40, t_max=40)
        df = to_spark_edges(spark, edges)
        counts = [sp.count_instances(df, motif, 12.0, phi) for phi in (0, 3, 6, 12)]
        assert counts == sorted(counts, reverse=True)

    def test_delta_monotonicity_of_work(self, spark):
        """#instances grows with delta (Fig. 9's qualitative shape).

        Maximal-instance counts are not strictly monotone in delta in
        general (windows merge), so assert over the generated passenger
        data where growth is robust."""
        motif = MOTIFS["M(3,2)"]
        edges = random_edges(3, n_nodes=6, n_edges=50, t_max=30)
        df = to_spark_edges(spark, edges)
        small = sp.count_instances(df, motif, 2.0, 0.0)
        large = sp.count_instances(df, motif, 20.0, 0.0)
        assert large >= small


class TestTopK:
    @pytest.mark.parametrize("seed", [0, 5])
    @pytest.mark.parametrize("k", [1, 3, 10])
    def test_matches_python_topk(self, spark, seed, k):
        motif = MOTIFS["M(3,2)"]
        edges = random_edges(seed, n_nodes=6, n_edges=35, t_max=40)
        got = sp.topk_flows(to_spark_edges(spark, edges), motif, 12.0, k)
        assert got == topk_graph(edges, motif, 12.0, k)

    def test_topk_sorted_desc(self, spark):
        motif = MOTIFS["M(3,2)"]
        edges = random_edges(2, n_nodes=6, n_edges=40, t_max=40)
        flows = sp.topk_flows(to_spark_edges(spark, edges), motif, 15.0, 5)
        assert flows == sorted(flows, reverse=True)


class TestMaxFlowDP:
    @pytest.mark.parametrize("seed", [1, 4])
    @pytest.mark.parametrize("name", ["M(3,2)", "M(3,3)"])
    def test_matches_python_dp(self, spark, seed, name):
        motif = MOTIFS[name]
        edges = random_edges(seed, n_nodes=6, n_edges=35, t_max=40)
        got = sp.max_flow(to_spark_edges(spark, edges), motif, 12.0)
        assert got == pytest.approx(max_flow_graph(edges, motif, 12.0))

    def test_dp_equals_top1(self, spark):
        motif = MOTIFS["M(3,2)"]
        edges = random_edges(8, n_nodes=6, n_edges=40, t_max=40)
        df = to_spark_edges(spark, edges)
        top = sp.topk_flows(df, motif, 12.0, 1)
        assert sp.max_flow(df, motif, 12.0) == pytest.approx(
            top[0] if top else 0.0
        )

    def test_no_instances_returns_zero(self, spark):
        motif = MOTIFS["M(5,5)A"]
        assert sp.max_flow(to_spark_edges(spark, FIG2_EDGES), motif, 10.0) == 0.0


class TestPhase1Helper:
    def test_count_and_time(self, spark):
        n, secs = sp.phase1_count_and_time(
            spark, to_spark_edges(spark, FIG2_EDGES), MOTIFS["M(3,3)"]
        )
        assert n == 3
        assert secs > 0
