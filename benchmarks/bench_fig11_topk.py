"""Fig. 11 benchmark: top-k search; the k-th flow is recorded per k."""
import pytest

from repro.core.motif import MOTIFS
from repro.experiments import defaults
from repro.spark.search import topk_flows

pytestmark = pytest.mark.benchmark(group="fig11-topk")


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
@pytest.mark.parametrize("k", [1, 10, 100])
def test_fig11_topk(benchmark, datasets, kind, k):
    edges, (delta, _) = datasets[kind], defaults(kind)
    motif = MOTIFS["M(3,2)"]
    flows = benchmark.pedantic(
        lambda: topk_flows(edges, motif, delta, k), rounds=2, iterations=1
    )
    benchmark.extra_info.update(
        dataset=kind, motif="M(3,2)", k=k,
        kth_flow=flows[-1] if flows else None,
        top_flow=flows[0] if flows else None,
    )
    # the k-th flow is non-increasing in k (Fig. 11's shape)
    assert flows == sorted(flows, reverse=True)
