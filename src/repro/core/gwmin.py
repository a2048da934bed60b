"""GWMIN greedy MWIS algorithm (paper Appendix B, Alg 8) and its
guaranteed weight bound (Eq 10), used both as the Greedy Optimizer's
plan finder and as the pruning bound for conflict-ridden candidates.
"""
from __future__ import annotations

from .graph import SharonGraph
from .model import SharingCandidate


def guaranteed_weight(graph: SharonGraph) -> float:
    """Eq 10: GWMIN's output weight is >= sum of w(u) / (degree(u) + 1)."""
    return sum(
        graph.weights[v.key()] / (len(graph.adj[v.key()]) + 1)
        for v in graph.vertices
    )


def gwmin(graph: SharonGraph) -> list[SharingCandidate]:
    """Algorithm 8: repeatedly take the vertex maximizing w/(deg+1) and
    drop its closed neighborhood. Returns the independent set (a valid
    sharing plan). Ties break on the earliest-constructed vertex, which
    keeps runs deterministic."""
    g = graph.copy()
    independent: list[SharingCandidate] = []
    while g.vertices:
        best = max(
            g.vertices,
            key=lambda v: g.weights[v.key()] / (len(g.adj[v.key()]) + 1),
        )
        independent.append(best)
        doomed = [best] + g.neighbors(best)
        for v in doomed:
            g.remove_vertex(v)
    return independent
