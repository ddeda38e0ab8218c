"""Fig. 12 benchmark: top-1 search — general heap top-k(1) vs the DP module."""
import pytest

from repro.core.motif import MOTIFS
from repro.experiments import defaults
from repro.spark.search import max_flow, topk_flows

pytestmark = pytest.mark.benchmark(group="fig12-dp")

MOTIF_NAMES = ["M(3,2)", "M(3,3)"]


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
@pytest.mark.parametrize("name", MOTIF_NAMES)
def test_fig12_top1_heap(benchmark, datasets, kind, name):
    edges, (delta, _) = datasets[kind], defaults(kind)
    motif = MOTIFS[name]
    flows = benchmark.pedantic(
        lambda: topk_flows(edges, motif, delta, 1), rounds=2, iterations=1
    )
    benchmark.extra_info.update(
        dataset=kind, motif=name, algo="heap",
        top1_flow=flows[0] if flows else 0.0,
    )


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
@pytest.mark.parametrize("name", MOTIF_NAMES)
def test_fig12_top1_dp(benchmark, datasets, kind, name):
    edges, (delta, _) = datasets[kind], defaults(kind)
    motif = MOTIFS[name]
    best = benchmark.pedantic(
        lambda: max_flow(edges, motif, delta), rounds=2, iterations=1
    )
    benchmark.extra_info.update(dataset=kind, motif=name, algo="dp", top1_flow=best)
