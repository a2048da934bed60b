"""Benefit model unit tests (Eqs 1-8) including the documented edge
conventions (empty prefix/suffix, whole-pattern sharing, repeated
types) and the structural properties Section 3.4 claims (benefit grows
with query count, pattern length and stream rate)."""
import pytest

from repro.core.cost import CostModel, uniform_rates
from repro.core.model import Query, SharingCandidate, Workload


def make(patterns, rates=None, rate=10.0):
    wl = Workload.from_patterns(patterns)
    rates = rates or uniform_rates(wl.event_types, rate)
    return wl, CostModel(wl, rates)


class TestRates:
    def test_pattern_rate_is_sum(self):
        wl, cm = make([("A", "B", "C"), ("A", "B")], rates={"A": 1, "B": 2, "C": 4})
        assert cm.pattern_rate(("A", "B", "C")) == 7

    def test_repeated_type_counts_twice(self):
        wl, cm = make([("A", "B", "A"), ("B", "A")], rates={"A": 3, "B": 5})
        assert cm.pattern_rate(("A", "B", "A")) == 11

    def test_default_rate_for_unknown_type(self):
        wl, cm = make([("A", "B"), ("B", "A")], rates={"A": 2})
        assert cm.rate("B") == 1.0

    def test_empty_pattern_rate_zero(self):
        wl, cm = make([("A", "B"), ("B", "A")])
        assert cm.pattern_rate(()) == 0.0


class TestNonShared:
    def test_eq2(self):
        wl, cm = make([("A", "B", "C"), ("A", "B")], rates={"A": 2, "B": 3, "C": 5})
        assert cm.non_shared_query(wl[0]) == 2 * (2 + 3 + 5)

    def test_eq3_sums_queries(self):
        wl, cm = make([("A", "B", "C"), ("A", "B", "D")], rates={"A": 2, "B": 3, "C": 5, "D": 1})
        cand = SharingCandidate(("A", "B"), frozenset({0, 1}))
        assert cm.non_shared(cand) == 2 * 10 + 2 * 6


class TestShared:
    def test_comp_middle(self):
        wl, cm = make(
            [("X", "A", "B", "Y"), ("Z", "A", "B", "W")],
            rates={"X": 2, "A": 3, "B": 4, "Y": 5, "Z": 6, "W": 7},
        )
        # prefix (X): 2*2; suffix (Y): 5*5.
        assert cm.comp(("A", "B"), wl[0]) == 4 + 25

    def test_comp_empty_prefix(self):
        wl, cm = make([("A", "B", "Y"), ("A", "B", "W")], rates={"A": 3, "B": 4, "Y": 5, "W": 7})
        assert cm.comp(("A", "B"), wl[0]) == 25

    def test_comb_all_three_factors(self):
        wl, cm = make(
            [("X", "A", "B", "Y"), ("Z", "A", "B", "W")],
            rates={"X": 2, "A": 3, "B": 4, "Y": 5, "Z": 6, "W": 7},
        )
        assert cm.comb(("A", "B"), wl[0]) == 2 * 3 * 5

    def test_comb_no_suffix(self):
        wl, cm = make([("X", "A", "B"), ("Z", "A", "B")], rates={"X": 2, "A": 3, "B": 4, "Z": 6})
        assert cm.comb(("A", "B"), wl[0]) == 2 * 3

    def test_whole_pattern_zero_overheads(self):
        wl, cm = make([("A", "B"), ("A", "B", "C")])
        assert cm.comp(("A", "B"), wl[0]) == 0.0
        assert cm.comb(("A", "B"), wl[0]) == 0.0

    def test_eq7_counts_shared_chain_once(self):
        wl, cm = make(
            [("X", "A", "B"), ("Z", "A", "B")], rates={"X": 2, "A": 3, "B": 4, "Z": 6}
        )
        cand = SharingCandidate(("A", "B"), frozenset({0, 1}))
        per_query = sum(cm.shared_query(("A", "B"), wl[i]) for i in (0, 1))
        assert cm.shared(cand) == 3 * 7 + per_query


class TestBenefit:
    def test_sharing_whole_pattern_always_beneficial(self):
        wl, cm = make([("A", "B", "C"), ("A", "B", "C")])
        cand = SharingCandidate(("A", "B", "C"), frozenset({0, 1}))
        # Non-shared evaluates the chain twice, shared once; no overhead.
        assert cm.bvalue(cand) == cm.non_shared_query(wl[0])

    def test_benefit_grows_with_queries(self):
        pats3 = [("X%d" % i, "A", "B") for i in range(3)]
        pats6 = [("X%d" % i, "A", "B") for i in range(6)]
        wl3, cm3 = make(pats3)
        wl6, cm6 = make(pats6)
        b3 = cm3.bvalue(SharingCandidate(("A", "B"), frozenset(range(3))))
        b6 = cm6.bvalue(SharingCandidate(("A", "B"), frozenset(range(6))))
        assert b6 > b3 > 0

    def test_benefit_grows_with_rate(self):
        pats = [("X", "A", "B", "C"), ("Y", "A", "B", "C")]
        _, lo = make(pats, rate=5.0)
        _, hi = make(pats, rate=50.0)
        cand = SharingCandidate(("A", "B", "C"), frozenset({0, 1}))
        assert hi.bvalue(cand) > lo.bvalue(cand)

    def test_benefit_grows_with_shared_length(self):
        short = [("X", "A", "B", "Q", "R"), ("Y", "A", "B", "S", "T")]
        long_ = [("X", "A", "B", "C", "D"), ("Y", "A", "B", "C", "D")]
        _, cs = make(short)
        _, cl = make(long_)
        b_short = cs.bvalue(SharingCandidate(("A", "B"), frozenset({0, 1})))
        b_long = cl.bvalue(SharingCandidate(("A", "B", "C", "D"), frozenset({0, 1})))
        assert b_long > b_short

    def test_non_beneficial_candidate_exists(self):
        # Short shared mid-pattern at high rates: the three-factor Comb
        # term (Eq 5) dominates and sharing loses — the reason Sharon
        # prunes non-beneficial candidates (Section 3.4).
        pats = [("X", "A", "B", "Y1", "Y2"), ("Z", "A", "B", "W1", "W2")]
        wl, cm = make(pats, rate=100.0)
        cand = SharingCandidate(("A", "B"), frozenset({0, 1}))
        assert cm.bvalue(cand) < 0

    def test_bvalue_cached(self):
        wl, cm = make([("A", "B"), ("A", "B", "C")])
        cand = SharingCandidate(("A", "B"), frozenset({0, 1}))
        assert cm.bvalue(cand) == cm.bvalue(cand)
        assert len(cm._bvalue_cache) == 1


class TestModelValidation:
    def test_sharing_candidate_needs_two_queries(self):
        with pytest.raises(ValueError):
            SharingCandidate(("A", "B"), frozenset({0}))

    def test_sharing_candidate_needs_length_two(self):
        with pytest.raises(ValueError):
            SharingCandidate(("A",), frozenset({0, 1}))

    def test_query_prefix_suffix(self):
        q = Query(qid=0, pattern=("A", "B", "C", "D"))
        assert q.prefix_suffix(("B", "C")) == (("A",), ("D",))
        assert q.prefix_suffix(("A", "B")) == ((), ("C", "D"))
        with pytest.raises(ValueError):
            q.prefix_suffix(("X", "Y"))
