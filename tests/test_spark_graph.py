"""Spark graph layer: time-series graph construction and Table 3 stats."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.spark.graph import STATS_SQL, dataset_stats, distinct_pairs, timeseries_graph
from tests.conftest import to_spark_edges

EDGES = [
    (1, 2, 13.0, 5.0),
    (1, 2, 15.0, 7.0),
    (3, 1, 10.0, 10.0),
    (2, 3, 18.0, 20.0),
]


class TestTimeseriesGraph:
    def test_merges_parallel_edges(self, spark):
        gt = timeseries_graph(to_spark_edges(spark, EDGES))
        rows = {(r.src, r.dst): (list(r.ts), list(r.fs)) for r in gt.collect()}
        assert rows[(1, 2)] == ([13.0, 15.0], [5.0, 7.0])
        assert rows[(3, 1)] == ([10.0], [10.0])
        assert rows[(2, 3)] == ([18.0], [20.0])
        assert len(rows) == 3

    def test_series_sorted_even_if_input_unsorted(self, spark):
        edges = [(1, 2, 15.0, 7.0), (1, 2, 13.0, 5.0), (1, 2, 14.0, 1.0)]
        gt = timeseries_graph(to_spark_edges(spark, edges))
        row = gt.collect()[0]
        assert list(row.ts) == [13.0, 14.0, 15.0]
        assert list(row.fs) == [5.0, 1.0, 7.0]

    def test_distinct_pairs(self, spark):
        pairs = distinct_pairs(to_spark_edges(spark, EDGES))
        assert {(r.src, r.dst) for r in pairs.collect()} == {
            (1, 2),
            (3, 1),
            (2, 3),
        }

    def test_pair_count_matches_timeseries_rowcount(self, bitcoin_small):
        assert (
            distinct_pairs(bitcoin_small).count()
            == timeseries_graph(bitcoin_small).count()
        )


class TestDatasetStats:
    def test_stats_toy_graph_oracle(self, spark):
        edges = to_spark_edges(spark, EDGES)
        assert_equivalent(dataset_stats(spark, edges), STATS_SQL, edges=edges)

    def test_stats_values(self, spark):
        row = dataset_stats(spark, to_spark_edges(spark, EDGES)).collect()[0]
        assert row.n_nodes == 3
        assert row.n_pairs == 3
        assert row.n_edges == 4
        assert row.avg_flow == pytest.approx(10.5)

    @pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
    def test_stats_generated_oracle(self, spark, kind):
        edges = synth_data.interactions(spark, kind, sf=0.1, seed=1)
        assert_equivalent(dataset_stats(spark, edges), STATS_SQL, edges=edges)

    def test_stats_match_pandas_generator_stats(self, spark):
        from repro.networks import generators as gen

        pdf = synth_data.interactions_pdf("passenger", sf=0.3, seed=2)
        expected = gen.stats(pdf)
        row = dataset_stats(
            spark, spark.createDataFrame(pdf, schema="src long, dst long, t double, f double")
        ).collect()[0]
        assert row.n_nodes == expected["n_nodes"]
        assert row.n_pairs == expected["n_pairs"]
        assert row.n_edges == expected["n_edges"]
        assert row.avg_flow == pytest.approx(expected["avg_flow"])
