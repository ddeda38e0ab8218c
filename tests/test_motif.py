"""Unit tests for the motif model and the Figure 3 catalog."""
import pytest

from repro.core.motif import MOTIF_ORDER, MOTIFS, Motif


def test_catalog_has_ten_motifs():
    assert len(MOTIFS) == 10
    assert set(MOTIF_ORDER) == set(MOTIFS)


@pytest.mark.parametrize(
    "name,n_nodes,m",
    [
        ("M(3,2)", 3, 2),
        ("M(3,3)", 3, 3),
        ("M(4,3)", 4, 3),
        ("M(4,4)A", 4, 4),
        ("M(4,4)B", 4, 4),
        ("M(4,4)C", 4, 4),
        ("M(5,4)", 5, 4),
        ("M(5,5)A", 5, 5),
        ("M(5,5)B", 5, 5),
        ("M(5,5)C", 5, 5),
    ],
)
def test_catalog_shapes(name, n_nodes, m):
    motif = MOTIFS[name]
    assert motif.n_nodes == n_nodes
    assert motif.m == m


@pytest.mark.parametrize("name", MOTIF_ORDER)
def test_edges_follow_spanning_path(name):
    motif = MOTIFS[name]
    edges = motif.edges
    assert len(edges) == motif.m
    for (u1, v1), (u2, v2) in zip(edges, edges[1:]):
        assert v1 == u2, "consecutive motif edges must chain head-to-tail"
    assert len(set(edges)) == len(edges), "motif edges are distinct pairs"


@pytest.mark.parametrize(
    "name,cyclic",
    [("M(3,2)", False), ("M(3,3)", True), ("M(4,3)", False), ("M(4,4)A", True),
     ("M(5,4)", False), ("M(5,5)C", True)],
)
def test_cyclicity(name, cyclic):
    assert MOTIFS[name].is_cyclic() is cyclic


def test_cycle_motifs_close_on_expected_node():
    assert MOTIFS["M(4,4)A"].path[-1] == 0
    assert MOTIFS["M(4,4)B"].path[-1] == 1
    assert MOTIFS["M(4,4)C"].path[-1] == 2
    assert MOTIFS["M(5,5)A"].path[-1] == 0
    assert MOTIFS["M(5,5)B"].path[-1] == 1
    assert MOTIFS["M(5,5)C"].path[-1] == 2


def test_rejects_non_canonical_numbering():
    with pytest.raises(ValueError):
        Motif("bad", (1, 2, 3))
    with pytest.raises(ValueError):
        Motif("bad", (0, 2, 1))


def test_rejects_trivial_path():
    with pytest.raises(ValueError):
        Motif("bad", (0,))


def test_rejects_repeated_motif_edge():
    with pytest.raises(ValueError):
        Motif("bad", (0, 1, 0, 1))


def test_motif_is_hashable_and_frozen():
    m = MOTIFS["M(3,3)"]
    assert hash(m) == hash(Motif("M(3,3)", (0, 1, 2, 0)))
    with pytest.raises(Exception):
        m.name = "other"
