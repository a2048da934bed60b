"""Kernel correctness: chains, C-matrices and segment composition
against an independent brute-force dynamic program, on handcrafted
streams (including the paper's Figures 6-7 examples) and on randomized
streams via hypothesis."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.runtime.kernels import (
    Segment,
    SharedCache,
    brute_force_count,
    c_matrix,
    chain_counts,
    compile_segments,
    count_pattern,
    eval_query,
    strict_prev_cumsum,
)


def stream(*events):
    """events: (time, type) pairs -> (times, types) numpy arrays."""
    times = np.array([t for t, _ in events], dtype=np.int64)
    types = np.array([ty for _, ty in events], dtype="U8")
    order = np.argsort(times, kind="stable")
    return times[order], types[order]


class TestStrictPrevCumsum:
    def test_simple(self):
        t = np.array([1, 2, 3], dtype=np.int64)
        v = np.array([1.0, 2.0, 4.0])
        assert strict_prev_cumsum(t, v).tolist() == [0.0, 1.0, 3.0]

    def test_ties_excluded(self):
        t = np.array([1, 1, 2, 2], dtype=np.int64)
        v = np.ones(4)
        assert strict_prev_cumsum(t, v).tolist() == [0.0, 0.0, 2.0, 2.0]

    def test_empty(self):
        assert strict_prev_cumsum(
            np.array([], dtype=np.int64), np.array([])
        ).size == 0


class TestPaperFigure6:
    """Example 1: stream a1 b2 a3 b4 b5, pattern (A, B)."""

    def test_counts_after_each_b(self):
        times, types = stream((1, "A"), (2, "B"), (3, "A"), (4, "B"), (5, "B"))
        comp = chain_counts(times, types, ("A", "B"))
        # b2 completes 1 sequence, b4 completes 2, b5 completes 2;
        # running count(A,B) after b4 is 3, after b5 is 5 (paper's values).
        assert comp.tolist() == [0.0, 1.0, 0.0, 2.0, 2.0]
        assert float(np.cumsum(comp)[3]) == 3.0
        assert float(comp.sum()) == 5.0


class TestPaperFigure7:
    """Example 3: count(A,B,C,D) combined from count(A,B) and count(C,D)."""

    EVENTS = [(1, "A"), (2, "B"), (3, "A"), (3, "C"), (4, "B"), (5, "B"),
              (5, "D"), (7, "C"), (8, "D")]

    def test_full_pattern_count_is_7(self):
        times, types = stream(*self.EVENTS)
        assert count_pattern(times, types, ("A", "B", "C", "D")) == 7.0

    def test_shared_combination_matches(self):
        times, types = stream(*self.EVENTS)
        cache = SharedCache(times, types)
        segs = [Segment(("A", "B"), shared=False), Segment(("C", "D"), shared=True)]
        assert eval_query(times, types, segs, cache) == 7.0

    def test_c_matrix_per_start_counts(self):
        # count(c3, D) = 2 (d5, d8); count(c7, D) = 1 (d8) -- Figure 7 rows.
        times, types = stream(*self.EVENTS)
        start_idx, end_idx, c = c_matrix(times, types, ("C", "D"))
        per_start = c.sum(axis=1)
        assert per_start.tolist() == [2.0, 1.0]


@pytest.mark.parametrize(
    "pattern",
    [("A", "B"), ("A", "B", "C"), ("B", "A"), ("A", "B", "A"), ("A", "A")],
)
def test_chain_matches_brute_force_handcrafted(pattern):
    times, types = stream(
        (1, "A"), (2, "B"), (2, "A"), (3, "C"), (4, "A"), (5, "B"), (5, "C"),
        (6, "A"), (7, "B"),
    )
    assert count_pattern(times, types, pattern) == brute_force_count(
        times, types, pattern
    )


class TestCompileSegments:
    def test_no_shared(self):
        segs = compile_segments(("A", "B", "C"), [])
        assert segs == [Segment(("A", "B", "C"), False)]

    def test_middle_shared(self):
        segs = compile_segments(("A", "B", "C", "D"), [("B", "C")])
        assert segs == [
            Segment(("A",), False),
            Segment(("B", "C"), True),
            Segment(("D",), False),
        ]

    def test_two_shared(self):
        segs = compile_segments(
            ("A", "B", "C", "D", "E"), [("D", "E"), ("A", "B")]
        )
        assert segs == [
            Segment(("A", "B"), True),
            Segment(("C",), False),
            Segment(("D", "E"), True),
        ]

    def test_whole_pattern_shared(self):
        segs = compile_segments(("A", "B"), [("A", "B")])
        assert segs == [Segment(("A", "B"), True)]

    def test_overlapping_shared_rejected(self):
        with pytest.raises(ValueError):
            compile_segments(("A", "B", "C"), [("A", "B"), ("B", "C")])

    def test_absent_pattern_rejected(self):
        with pytest.raises(ValueError):
            compile_segments(("A", "B"), [("X", "Y")])


SEGMENTATIONS = [
    ("prefix-shared-suffix", ("A", "B", "C", "D"), [("B", "C")]),
    ("shared-suffix", ("A", "B", "C"), [("A", "B")]),
    ("prefix-shared", ("A", "B", "C"), [("B", "C")]),
    ("all-shared", ("A", "B", "C"), [("A", "B", "C")]),
    ("two-shared", ("A", "B", "C", "D"), [("A", "B"), ("C", "D")]),
    ("long-shared", ("A", "B", "C", "D", "E"), [("B", "C", "D")]),
]


@pytest.mark.parametrize("name,qpat,shared", SEGMENTATIONS, ids=[s[0] for s in SEGMENTATIONS])
def test_shared_equals_nonshared_handcrafted(name, qpat, shared):
    rng = np.random.default_rng(hash(name) % 2**32)
    n = 60
    times = np.sort(rng.integers(0, 40, n)).astype(np.int64)
    types = rng.choice(list("ABCDE"), n).astype("U8")
    cache = SharedCache(times, types)
    segs = compile_segments(qpat, shared)
    shared_cnt = eval_query(times, types, segs, cache)
    plain_cnt = count_pattern(times, types, qpat)
    assert shared_cnt == plain_cnt
    assert cache.builds == len(shared)


@settings(max_examples=60, deadline=None)
@given(
    data=st.lists(
        st.tuples(st.integers(0, 15), st.sampled_from("ABC")),
        min_size=0,
        max_size=25,
    ),
    pattern=st.sampled_from(
        [("A", "B"), ("A", "B", "C"), ("C", "A"), ("B", "B"), ("A", "C", "B")]
    ),
)
def test_chain_matches_brute_force_random(data, pattern):
    if not data:
        return
    times, types = stream(*data)
    assert count_pattern(times, types, pattern) == brute_force_count(
        times, types, pattern
    )


@settings(max_examples=60, deadline=None)
@given(
    data=st.lists(
        st.tuples(st.integers(0, 20), st.sampled_from("ABCD")),
        min_size=1,
        max_size=30,
    ),
)
def test_shared_combination_matches_brute_force_random(data):
    times, types = stream(*data)
    qpat = ("A", "B", "C", "D")
    cache = SharedCache(times, types)
    segs = compile_segments(qpat, [("B", "C")])
    assert eval_query(times, types, segs, cache) == brute_force_count(
        times, types, qpat
    )


class TestSharedCacheReuse:
    def test_c_built_once_for_many_queries(self):
        rng = np.random.default_rng(7)
        times = np.sort(rng.integers(0, 50, 80)).astype(np.int64)
        types = rng.choice(list("ABCDEF"), 80).astype("U8")
        cache = SharedCache(times, types)
        for qpat in [("A", "B", "C"), ("D", "B", "C"), ("E", "B", "C", "F")]:
            eval_query(times, types, compile_segments(qpat, [("B", "C")]), cache)
        # Two shared aggregates total: the reverse chain (suffix-position
        # queries 1-2 reuse it) and the C-matrix (mid-position query 3);
        # never one build per query.
        assert cache.builds == 2

    def test_state_bytes_positive(self):
        times, types = stream((1, "A"), (2, "B"))
        cache = SharedCache(times, types)
        cache.get(("A", "B"))
        assert cache.state_bytes == 8  # one 1x1 C matrix


class TestEdgeCases:
    def test_no_matching_events(self):
        times, types = stream((1, "X"), (2, "Y"))
        assert count_pattern(times, types, ("A", "B")) == 0.0

    def test_single_event_pattern(self):
        times, types = stream((1, "A"), (2, "A"), (3, "B"))
        assert count_pattern(times, types, ("A",)) == 2.0

    def test_all_same_timestamp_no_sequences(self):
        times, types = stream((5, "A"), (5, "B"), (5, "A"), (5, "B"))
        assert count_pattern(times, types, ("A", "B")) == 0.0

    def test_repeated_type_in_pattern(self):
        # Section 7.3: (A, A) over a1 a2 a3 -> 3 pairs.
        times, types = stream((1, "A"), (2, "A"), (3, "A"))
        assert count_pattern(times, types, ("A", "A")) == 3.0

    def test_shared_segment_empty_starts(self):
        times, types = stream((1, "A"), (2, "B"))
        cache = SharedCache(times, types)
        segs = [Segment(("C", "D"), True)]
        assert eval_query(times, types, segs, cache) == 0.0
