"""Phase P1 reference DFS (repro.core.structural) tests."""
import itertools
import random

import pytest

from repro.core.motif import MOTIF_ORDER, MOTIFS
from repro.core.structural import adjacency, match_edge_pairs, structural_matches

# A small graph with chains, a triangle cycle and a 4-cycle.
PAIRS = [
    ("a", "b"),
    ("b", "c"),
    ("c", "a"),  # triangle a->b->c->a
    ("c", "d"),
    ("d", "e"),
    ("d", "a"),  # 4-cycle a->b->c->d->a
]


def brute_matches(pairs, motif):
    """Independent oracle: try every injective node assignment."""
    nodes = sorted({x for p in pairs for x in p})
    pairset = set(pairs)
    k = motif.n_nodes
    out = []
    for perm in itertools.permutations(nodes, k):
        if all((perm[u], perm[v]) in pairset for u, v in motif.edges):
            out.append(perm)
    return sorted(out)


class TestDFSMatcher:
    def test_chain_m32(self):
        got = structural_matches(PAIRS, MOTIFS["M(3,2)"])
        assert got == brute_matches(PAIRS, MOTIFS["M(3,2)"])
        assert ("a", "b", "c") in got

    def test_triangle_m33(self):
        got = structural_matches(PAIRS, MOTIFS["M(3,3)"])
        # the triangle in all three rotations
        assert got == [("a", "b", "c"), ("b", "c", "a"), ("c", "a", "b")]

    def test_4cycle_m44a(self):
        got = structural_matches(PAIRS, MOTIFS["M(4,4)A"])
        assert got == brute_matches(PAIRS, MOTIFS["M(4,4)A"])
        assert ("a", "b", "c", "d") in got

    @pytest.mark.parametrize("name", MOTIF_ORDER)
    def test_all_motifs_vs_permutation_oracle(self, name):
        motif = MOTIFS[name]
        assert structural_matches(PAIRS, motif) == brute_matches(PAIRS, motif)

    @pytest.mark.parametrize("seed", range(10))
    @pytest.mark.parametrize("name", ["M(3,2)", "M(3,3)", "M(4,3)", "M(4,4)B"])
    def test_random_graphs_vs_permutation_oracle(self, seed, name):
        rng = random.Random(400 + seed)
        nodes = list(range(7))
        pairs = {
            (u, v)
            for u, v in (rng.sample(nodes, 2) for _ in range(18))
        }
        motif = MOTIFS[name]
        assert structural_matches(pairs, motif) == brute_matches(pairs, motif)

    def test_bijection_distinctness(self):
        # self-loop-free injectivity: a->b->a is NOT a match of M(3,2)
        pairs = [("a", "b"), ("b", "a")]
        assert structural_matches(pairs, MOTIFS["M(3,2)"]) == []
        # but a->b->c is
        pairs = [("a", "b"), ("b", "c")]
        assert structural_matches(pairs, MOTIFS["M(3,2)"]) == [("a", "b", "c")]

    def test_cycle_must_close_on_origin(self):
        pairs = [("a", "b"), ("b", "c"), ("c", "d")]
        assert structural_matches(pairs, MOTIFS["M(3,3)"]) == []

    def test_duplicate_pairs_counted_once(self):
        pairs = [("a", "b"), ("a", "b"), ("b", "c")]
        assert structural_matches(pairs, MOTIFS["M(3,2)"]) == [("a", "b", "c")]

    def test_empty_graph(self):
        assert structural_matches([], MOTIFS["M(3,2)"]) == []


class TestHelpers:
    def test_adjacency_dedupes_and_sorts(self):
        adj = adjacency([("a", "c"), ("a", "b"), ("a", "c")])
        assert adj == {"a": ["b", "c"]}

    def test_match_edge_pairs_follows_spanning_path(self):
        motif = MOTIFS["M(3,3)"]
        assert match_edge_pairs(motif, ("x", "y", "z")) == [
            ("x", "y"),
            ("y", "z"),
            ("z", "x"),
        ]

    def test_match_edge_pairs_revisit(self):
        motif = MOTIFS["M(4,4)C"]  # 0-1-2-3-2
        assert match_edge_pairs(motif, ("p", "q", "r", "s")) == [
            ("p", "q"),
            ("q", "r"),
            ("r", "s"),
            ("s", "r"),
        ]
