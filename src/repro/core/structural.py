"""Phase P1 (reference implementation): structural matches via modified DFS.

The paper's P1 extracts all paths of length ``|E_M|`` in the time-series
graph ``G_T`` that match the motif's spanning path, honouring the vertex
bijection of Definition 3.2: motif vertices that coincide along the path
must map to the same graph vertex (e.g. cycles close), and *distinct* motif
vertices must map to *distinct* graph vertices.

This pure-Python DFS is the ground truth that the distributed
``repro.spark.structural`` join plan is tested against; it is also used
directly by the pure-Python end-to-end search on small graphs.
"""
from __future__ import annotations

from collections import defaultdict
from typing import Hashable, Iterable, Sequence

from .motif import Motif

Vertex = Hashable
Match = tuple[Vertex, ...]  # graph vertex assigned to motif node 0..n-1


def adjacency(pairs: Iterable[tuple[Vertex, Vertex]]) -> dict[Vertex, list[Vertex]]:
    """Out-adjacency of the time-series graph (distinct connected pairs)."""
    adj: dict[Vertex, list[Vertex]] = defaultdict(list)
    seen: set[tuple[Vertex, Vertex]] = set()
    for u, v in pairs:
        if (u, v) not in seen:
            seen.add((u, v))
            adj[u].append(v)
    for outs in adj.values():
        outs.sort()
    return dict(adj)


def structural_matches(
    pairs: Iterable[tuple[Vertex, Vertex]], motif: Motif
) -> list[Match]:
    """All structural matches of ``motif`` in the graph given by ``pairs``.

    A match is the tuple of graph vertices assigned to motif nodes
    ``0..n_nodes-1`` (canonical numbering, see :class:`Motif`). The DFS
    walks the spanning path; at each step the next motif node is either
    already bound (the path revisits it — the graph edge must return to the
    bound vertex) or fresh (any out-neighbour not used yet, enforcing the
    bijection's injectivity).
    """
    adj = adjacency(pairs)
    edge_set = {(u, v) for u, outs in adj.items() for v in outs}
    path = motif.path
    matches: list[Match] = []

    def dfs(step: int, binding: dict[int, Vertex], used: set[Vertex]) -> None:
        if step == len(path) - 1:
            matches.append(tuple(binding[i] for i in range(len(used))))
            return
        cur = binding[path[step]]
        nxt_node = path[step + 1]
        if nxt_node in binding:  # revisit: the edge must close on the binding
            tgt = binding[nxt_node]
            if (cur, tgt) in edge_set:
                dfs(step + 1, binding, used)
        else:
            for tgt in adj.get(cur, ()):
                if tgt not in used:
                    binding[nxt_node] = tgt
                    used.add(tgt)
                    dfs(step + 1, binding, used)
                    del binding[nxt_node]
                    used.remove(tgt)

    for v in sorted(adj.keys()):
        dfs(0, {path[0]: v}, {v})
    return sorted(matches)


def match_edge_pairs(motif: Motif, match: Sequence[Vertex]) -> list[tuple[Vertex, Vertex]]:
    """The G_T edge (vertex pair) instantiating each motif edge, in order."""
    return [(match[u], match[v]) for u, v in motif.edges]
