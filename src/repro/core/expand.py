"""Sharing conflict resolution (paper Section 7.1, Algs 5-6).

A candidate ``(p, Q_p)`` with conflicts is expanded into *options*
``(p, Q_p')`` with ``Q_p' ⊂ Q_p, |Q_p'| > 1``: dropping the queries that
cause a conflict frees the remaining queries to share p alongside the
conflicting candidate. The expanded graph (options as vertices, conflicts
recomputed, weights re-estimated on the smaller query sets) feeds the
reducer and plan finder; the Exhaustive and Sharon optimizers of
Section 8.3 both run on it.
"""
from __future__ import annotations

from itertools import combinations

from .cost import CostModel
from .graph import SharonGraph, conflicts_in_query
from .model import SharingCandidate, Workload


def conflict_causing_queries(
    workload: Workload, v: SharingCandidate, u: SharingCandidate
) -> frozenset[int]:
    """Queries in Q_v ∩ Q_u where the two patterns overlap (Def 6 "cause")."""
    if v.p == u.p:
        return frozenset(v.qids & u.qids)
    return frozenset(
        q
        for q in v.qids & u.qids
        if conflicts_in_query(workload[q].pattern, v.p, u.p)
    )


def expand_candidate(
    graph: SharonGraph, v: SharingCandidate, max_options: int = 128
) -> list[SharingCandidate]:
    """Algorithm 5: BFS over query-subset options of v.

    For each conflict (v, u) and each non-empty combination C of its
    causing queries (Def 16: the complement is dropped from u's side by
    u's own options), the option (p, Q_p \\ C) is generated if it still
    has > 1 query and is new.

    ``max_options`` bounds the option set: Eq 14 makes the worst case
    exponential in the number of conflict-causing queries (the paper
    notes this), so generation stops once the bound is hit. Options are
    extra sharing *opportunities* — truncating them can only lower the
    achievable score, never produce an invalid plan — and BFS order
    keeps the largest query sets (highest-benefit options) first.
    """
    options: dict[frozenset[int], SharingCandidate] = {v.qids: v}
    current = [v]
    while current and len(options) < max_options:
        nxt: list[SharingCandidate] = []
        for cand in current:
            for u in graph.neighbors(v):
                qc = conflict_causing_queries(graph.workload, cand, u)
                for r in range(1, len(qc) + 1):
                    for combo in combinations(sorted(qc), r):
                        qp = cand.qids - set(combo)
                        if len(qp) > 1 and qp not in options:
                            child = SharingCandidate(v.p, frozenset(qp))
                            options[qp] = child
                            nxt.append(child)
                            if len(options) >= max_options:
                                return list(options.values())
        current = nxt
    return list(options.values())


def expand_graph(
    graph: SharonGraph, cost: CostModel, max_options: int = 128
) -> SharonGraph:
    """Algorithm 6: expand every candidate, rebuild vertices and edges.

    Option weights are their own BValues under ``cost``; options that are
    not beneficial are dropped (Alg 1's Line 3 applies to the expanded
    graph too). The original candidates keep their recorded weights so an
    injected-weight graph (tests) stays consistent.
    """
    expanded = SharonGraph(graph.workload)
    for v in graph.vertices:
        for opt in expand_candidate(graph, v, max_options):
            if opt.key() in expanded.adj:
                continue
            if opt.key() == v.key():
                w = graph.weight(v)
            else:
                w = cost.bvalue(opt)
            if w > 0:
                expanded.add_vertex(opt, w)
    return expanded
