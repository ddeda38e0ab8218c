"""Tests for the synthetic interaction-network generators (DESIGN.md § 3)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import MOTIFS, count_graph
from repro.core.structural import structural_matches
from repro.networks import generators as gen

SF = 0.4  # small but structurally non-trivial


@pytest.fixture(scope="module", params=gen.DATASETS)
def kind(request):
    return request.param


@pytest.fixture(scope="module")
def pdf(kind):
    return gen.generate(kind, sf=SF, seed=0)


class TestSchemaAndInvariants:
    def test_columns_and_dtypes(self, pdf):
        assert list(pdf.columns) == ["src", "dst", "t", "f"]
        assert pdf.src.dtype == np.int64 and pdf.dst.dtype == np.int64
        assert pdf.t.dtype == np.float64 and pdf.f.dtype == np.float64

    def test_timestamps_globally_unique(self, pdf):
        assert pdf.t.is_unique, "paper assumes unique timestamps"

    def test_sorted_by_time(self, pdf):
        assert pdf.t.is_monotonic_increasing

    def test_flows_positive(self, pdf):
        assert (pdf.f > 0).all()

    def test_no_self_loops(self, pdf):
        assert (pdf.src != pdf.dst).all()

    def test_within_span(self, pdf, kind):
        assert pdf.t.min() >= 0
        assert pdf.t.max() <= gen.SPECS[kind].span * 1.5  # cascades may spill


class TestDeterminism:
    def test_same_seed_same_data(self, kind):
        a = gen.generate(kind, sf=0.2, seed=3)
        b = gen.generate(kind, sf=0.2, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_different_seed_different_data(self, kind):
        a = gen.generate(kind, sf=0.2, seed=3)
        b = gen.generate(kind, sf=0.2, seed=4)
        assert not a.equals(b)

    def test_sf_scales_size(self, kind):
        small = gen.generate(kind, sf=0.2, seed=0)
        big = gen.generate(kind, sf=0.6, seed=0)
        assert len(big) > len(small) * 1.5


class TestPaperShape:
    """The Table 3 traits each generator must preserve (DESIGN.md § 3)."""

    def test_avg_flow_near_paper(self, pdf, kind):
        paper = {"bitcoin": 4.845, "facebook": 3.014, "passenger": 1.933}[kind]
        assert gen.stats(pdf)["avg_flow"] == pytest.approx(paper, rel=0.25)

    def test_multi_edge_density_near_paper(self, pdf, kind):
        paper = {"bitcoin": 1.38, "facebook": 3.24, "passenger": 2.76}[kind]
        s = gen.stats(pdf)
        ratio = s["n_edges"] / s["n_pairs"]
        assert ratio == pytest.approx(paper, rel=0.35)

    def test_facebook_counts_are_integers(self):
        pdf = gen.generate("facebook", sf=0.2, seed=1)
        assert (pdf.f == pdf.f.round()).all()

    def test_passenger_counts_are_integers(self):
        pdf = gen.generate("passenger", sf=0.5, seed=1)
        assert (pdf.f == pdf.f.round()).all()

    def test_cyclic_structure_exists_in_bitcoin_and_facebook(self):
        for kind in ("bitcoin", "facebook"):
            pdf = gen.generate(kind, sf=0.5, seed=0)
            pairs = set(
                pdf[["src", "dst"]].drop_duplicates().itertuples(index=False, name=None)
            )
            assert len(structural_matches(pairs, MOTIFS["M(3,3)"])) > 0

    def test_passenger_acyclic_dominates(self):
        """Paper § 6.2.2: on Passenger, acyclic motifs dominate cyclic ones."""
        pdf = gen.generate("passenger", sf=1.0, seed=0)
        edges = list(pdf.itertuples(index=False, name=None))
        spec = gen.SPECS["passenger"]
        chain = count_graph(edges, MOTIFS["M(3,2)"], spec.delta_default, spec.phi_default)
        cycle = count_graph(edges, MOTIFS["M(3,3)"], spec.delta_default, spec.phi_default)
        assert chain > cycle

    def test_instances_exist_at_default_parameters(self, kind):
        pdf = gen.generate(kind, sf=1.0, seed=0)
        edges = list(pdf.itertuples(index=False, name=None))
        spec = gen.SPECS[kind]
        assert (
            count_graph(edges, MOTIFS["M(3,2)"], spec.delta_default, spec.phi_default)
            > 0
        )


class TestHelpers:
    def test_time_prefix(self, kind):
        pdf = gen.generate(kind, sf=0.3, seed=0)
        half = gen.time_prefix(pdf, 0.5, kind)
        assert len(half) < len(pdf)
        assert (half.t <= gen.SPECS[kind].span * 0.5).all()

    def test_time_prefix_full_keeps_most(self, kind):
        pdf = gen.generate(kind, sf=0.3, seed=0)
        # cascades may spill past the nominal span, so allow a small tail
        assert len(gen.time_prefix(pdf, 1.0, kind)) >= 0.9 * len(pdf)

    def test_stats_keys(self, pdf):
        s = gen.stats(pdf)
        assert set(s) == {"n_nodes", "n_pairs", "n_edges", "avg_flow"}

    def test_unknown_kind_raises(self):
        with pytest.raises(KeyError):
            gen.generate("twitter")

    def test_ensure_unique(self):
        g = np.random.default_rng(0)
        ts = np.array([1.0, 1.0, 2.0, 2.0, 2.0, 5.0])
        out = gen._ensure_unique(ts, g)
        assert len(np.unique(out)) == len(out)
        assert np.allclose(out, ts, atol=0.01)
