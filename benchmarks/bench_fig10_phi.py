"""Fig. 10 benchmark: #instances and runtime vs the flow constraint phi."""
import pytest

from repro.core.motif import MOTIFS
from repro.experiments import defaults
from repro.spark.search import count_instances

pytestmark = pytest.mark.benchmark(group="fig10-phi")


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
@pytest.mark.parametrize("factor", [0.0, 0.5, 1.0, 2.0])
def test_fig10_phi_sweep(benchmark, datasets, kind, factor):
    edges, (delta, phi0) = datasets[kind], defaults(kind)
    motif = MOTIFS["M(3,2)"]
    phi = phi0 * factor
    n = benchmark.pedantic(
        lambda: count_instances(edges, motif, delta, phi), rounds=2, iterations=1
    )
    benchmark.extra_info.update(
        dataset=kind, motif="M(3,2)", delta=delta, phi=phi, instances=n
    )
