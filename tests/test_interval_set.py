"""Unit + property tests for the OTCD prune bookkeeping (IntervalSet)."""
import random

import pytest

from repro.core.otcd import IntervalSet


class TestAdd:
    def test_disjoint(self):
        s = IntervalSet()
        assert s.add(1, 3) == 3
        assert s.add(10, 12) == 3
        assert s.intervals() == [(1, 3), (10, 12)]

    def test_overlap_counts_only_new(self):
        s = IntervalSet()
        s.add(1, 5)
        assert s.add(4, 8) == 3
        assert s.intervals() == [(1, 8)]

    def test_contained_adds_nothing(self):
        s = IntervalSet()
        s.add(1, 10)
        assert s.add(3, 7) == 0
        assert s.intervals() == [(1, 10)]

    def test_abutting_merges(self):
        s = IntervalSet()
        s.add(1, 3)
        s.add(4, 6)
        assert s.intervals() == [(1, 6)]

    def test_bridge_merge(self):
        s = IntervalSet()
        s.add(1, 3)
        s.add(7, 9)
        assert s.add(2, 8) == 3
        assert s.intervals() == [(1, 9)]

    def test_empty_interval(self):
        s = IntervalSet()
        assert s.add(5, 4) == 0
        assert s.intervals() == []

    def test_single_point(self):
        s = IntervalSet()
        assert s.add(5, 5) == 1
        assert s.covers(5) and not s.covers(4) and not s.covers(6)


class TestQueries:
    def test_covers(self):
        s = IntervalSet()
        s.add(2, 4)
        s.add(8, 9)
        assert [x for x in range(1, 11) if s.covers(x)] == [2, 3, 4, 8, 9]

    def test_next_uncovered_leq(self):
        s = IntervalSet()
        s.add(3, 5)
        assert s.next_uncovered_leq(10, 1) == 10
        assert s.next_uncovered_leq(5, 1) == 2
        assert s.next_uncovered_leq(4, 3) is None
        assert s.next_uncovered_leq(2, 1) == 2

    def test_next_uncovered_all_covered(self):
        s = IntervalSet()
        s.add(1, 10)
        assert s.next_uncovered_leq(10, 1) is None

    def test_count_uncovered(self):
        s = IntervalSet()
        s.add(3, 5)
        s.add(8, 8)
        assert s.count_uncovered(1, 10) == 6
        assert s.count_uncovered(3, 5) == 0
        assert s.count_uncovered(6, 7) == 2
        assert s.count_uncovered(7, 6) == 0


@pytest.mark.parametrize("seed", range(20))
def test_random_against_set_model(seed):
    """IntervalSet must behave exactly like a plain set of integers."""
    rng = random.Random(seed)
    s = IntervalSet()
    model: set[int] = set()
    for _ in range(60):
        lo = rng.randint(0, 50)
        hi = lo + rng.randint(-2, 8)
        newly = s.add(lo, hi)
        added = set(range(lo, hi + 1)) - model
        assert newly == len(added)
        model |= set(range(lo, hi + 1)) if lo <= hi else set()
        # covers
        x = rng.randint(0, 55)
        assert s.covers(x) == (x in model)
        # next_uncovered_leq
        ceil, floor = rng.randint(0, 55), rng.randint(0, 10)
        want = next((c for c in range(ceil, floor - 1, -1) if c not in model), None)
        assert s.next_uncovered_leq(ceil, floor) == want
        # count_uncovered
        a, b = sorted((rng.randint(0, 55), rng.randint(0, 55)))
        want_n = sum(1 for c in range(a, b + 1) if c not in model)
        assert s.count_uncovered(a, b) == want_n
    # intervals are sorted and disjoint
    iv = s.intervals()
    for (a1, b1), (a2, b2) in zip(iv, iv[1:]):
        assert b1 + 1 < a2
