"""Maximality postprocessing (repro/core/postprocess.py)."""
import random

from hypothesis import given, strategies as st

from repro.core.postprocess import maximal_only, timed_maximal_only


def reference(results):
    res = set(results)
    return {s for s in res if not any(s < t for t in res)}


class TestMaximalOnly:
    def test_simple_domination(self):
        a = frozenset({1, 2, 3})
        b = frozenset({1, 2, 3, 4})
        assert maximal_only([a, b]) == {b}

    def test_equal_sets_deduplicated(self):
        a = frozenset({1, 2})
        assert maximal_only([a, frozenset({1, 2})]) == {a}

    def test_incomparable_kept(self):
        a = frozenset({1, 2, 3})
        b = frozenset({2, 3, 4})
        assert maximal_only([a, b]) == {a, b}

    def test_empty(self):
        assert maximal_only([]) == set()

    @given(
        st.lists(
            st.frozensets(st.integers(0, 12), min_size=1, max_size=6),
            max_size=40,
        )
    )
    def test_matches_reference(self, sets):
        assert maximal_only(sets) == reference(sets)

    def test_large_random_matches_reference(self):
        rng = random.Random(0)
        sets = [
            frozenset(rng.sample(range(30), rng.randint(2, 8))) for _ in range(500)
        ]
        assert maximal_only(sets) == reference(sets)

    def test_timed_variant_returns_time(self):
        out, dt = timed_maximal_only([frozenset({1})])
        assert out == {frozenset({1})} and dt >= 0
