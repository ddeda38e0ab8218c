"""Fig. 8 benchmark: two-phase algorithm vs the join baseline.

Same (dataset, motif) cell benchmarked under both algorithms; the paper
reports the two-phase algorithm roughly 2x faster because the join plan
materializes sub-motif intermediates.
"""
import pytest

from repro.core.motif import MOTIFS
from repro.experiments import defaults
from repro.spark.join_baseline import count_instances_join
from repro.spark.search import count_instances

pytestmark = pytest.mark.benchmark(group="fig8")

MOTIF_NAMES = ["M(3,2)", "M(3,3)", "M(4,3)"]


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
@pytest.mark.parametrize("name", MOTIF_NAMES)
def test_fig8_twophase(benchmark, datasets, kind, name):
    edges, (delta, phi) = datasets[kind], defaults(kind)
    motif = MOTIFS[name]
    n = benchmark.pedantic(
        lambda: count_instances(edges, motif, delta, phi), rounds=2, iterations=1
    )
    benchmark.extra_info.update(dataset=kind, motif=name, algo="two-phase", instances=n)


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
@pytest.mark.parametrize("name", MOTIF_NAMES)
def test_fig8_join_baseline(benchmark, datasets, kind, name):
    edges, (delta, phi) = datasets[kind], defaults(kind)
    motif = MOTIFS[name]
    n = benchmark.pedantic(
        lambda: count_instances_join(edges, motif, delta, phi), rounds=2, iterations=1
    )
    benchmark.extra_info.update(dataset=kind, motif=name, algo="join", instances=n)
