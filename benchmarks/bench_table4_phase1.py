"""Table 4 benchmark: structural matches and phase-P1 runtime per motif.

One benchmark per (dataset, motif) cell; the match count and the paper's
cell are recorded in extra_info for EXPERIMENTS.md.
"""
import pytest

from repro.core.motif import MOTIF_ORDER, MOTIFS
from repro.experiments import PAPER_TABLE4
from repro.spark.graph import distinct_pairs
from repro.spark.structural import structural_matches_df

pytestmark = pytest.mark.benchmark(group="table4")


@pytest.mark.parametrize("kind", ["bitcoin", "facebook", "passenger"])
@pytest.mark.parametrize("name", MOTIF_ORDER)
def test_table4_phase1(benchmark, datasets, kind, name):
    pairs = distinct_pairs(datasets[kind]).cache()
    pairs.count()
    motif = MOTIFS[name]

    def run():
        return structural_matches_df(pairs, motif).count()

    n = benchmark.pedantic(run, rounds=2, iterations=1)
    p_n, p_t = PAPER_TABLE4[kind][name]
    benchmark.extra_info.update(
        dataset=kind, motif=name, matches=n,
        paper_matches=p_n, paper_p1_seconds=p_t,
    )
    assert n >= 0
