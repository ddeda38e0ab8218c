"""Table 3 benchmark: dataset statistics of each synthetic network.

Regenerates the Table 3 row per dataset (recorded in extra_info next to
the paper's values) and times the stats aggregate.
"""
import pytest

from repro.experiments import PAPER_TABLE3
from repro.spark.graph import dataset_stats

pytestmark = pytest.mark.benchmark(group="table3")


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
def test_table3_stats(benchmark, spark, datasets, kind):
    edges = datasets[kind]

    def run():
        return dataset_stats(spark, edges).collect()[0]

    row = benchmark.pedantic(run, rounds=2, iterations=1)
    benchmark.extra_info.update(
        dataset=kind,
        n_nodes=row.n_nodes,
        n_pairs=row.n_pairs,
        n_edges=row.n_edges,
        avg_flow=round(row.avg_flow, 3),
        paper=PAPER_TABLE3[kind],
    )
    assert row.n_edges > 0
    # avg flow must land near the paper's Table 3 value (the trait the
    # generator is built to preserve)
    assert row.avg_flow == pytest.approx(PAPER_TABLE3[kind]["avg_flow"], rel=0.25)
