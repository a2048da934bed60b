"""Sharable-pattern detection: modified CCSpan (paper Appendix A, Alg 7).

Enumerates every contiguous sub-pattern of length > 1 of every query
pattern and keeps those that occur in more than one query. Returns the
hash table S mapping each sharable pattern to the set of query ids
containing it -- the input to Sharon graph construction (Algorithm 1).
"""
from __future__ import annotations

from .model import Pattern, Workload


def sharable_patterns(workload: Workload) -> dict[Pattern, frozenset[int]]:
    """Algorithm 7: all frequent contiguous sub-patterns of length > 1.

    Time O(n * l^2) for n queries with max pattern length l; the paper
    treats l as a small constant, giving O(n).
    """
    h: dict[Pattern, set[int]] = {}
    for q in workload:
        pat = q.pattern
        l = len(pat)
        # Every contiguous substring with length > 1 (Lines 4-8).
        for end in range(2, l + 1):
            for start in range(0, end - 1):
                p = pat[start:end]
                h.setdefault(p, set()).add(q.qid)
    return {
        p: frozenset(qids) for p, qids in h.items() if len(qids) > 1
    }
