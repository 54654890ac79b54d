"""The brute-force oracle itself (repro/core/brute.py)."""
import pytest

from repro.core.bitset import mask_of
from repro.core.brute import brute_force_maximal, brute_force_valid, is_quasi_clique
from repro.core.graph import LocalGraph


def complete(n):
    return LocalGraph.from_edges(n, [(a, b) for a in range(n) for b in range(a + 1, n)])


class TestIsQuasiClique:
    def test_clique_is_quasi_clique_for_any_gamma(self):
        g = complete(5)
        for gamma in (0.5, 0.8, 1.0):
            assert is_quasi_clique(g, mask_of(range(5)), gamma)

    def test_paper_figure1_example(self):
        # S1 = {a,b,c,d} and S2 = S1∪{e} are 0.6-quasi-cliques (Section 3)
        # a=0 b=1 c=2 d=3 e=4; red/black edges of Figure 1's G(S)
        g = LocalGraph.from_edges(
            5, [(0, 1), (0, 2), (0, 3), (1, 2), (2, 3), (0, 4), (1, 4), (2, 4), (3, 4)]
        )
        assert is_quasi_clique(g, mask_of({0, 1, 2, 3}), 0.6)
        assert is_quasi_clique(g, mask_of({0, 1, 2, 3, 4}), 0.6)

    def test_disconnected_rejected(self):
        g = LocalGraph.from_edges(4, [(0, 1), (2, 3)])
        assert not is_quasi_clique(g, mask_of({0, 1, 2, 3}), 0.3)

    def test_degree_violation_rejected(self):
        g = LocalGraph.from_edges(4, [(0, 1), (1, 2), (2, 3)])  # path
        assert not is_quasi_clique(g, mask_of({0, 1, 2, 3}), 0.7)

    def test_empty_set_rejected(self):
        assert not is_quasi_clique(complete(3), 0, 0.5)

    def test_singleton_is_quasi_clique(self):
        assert is_quasi_clique(complete(3), mask_of({1}), 1.0)


class TestBruteForce:
    def test_clique_single_maximal(self):
        g = complete(5)
        assert brute_force_maximal(g, 0.8, 3) == {frozenset(range(5))}

    def test_size_threshold_filters(self):
        g = complete(3)
        assert brute_force_maximal(g, 0.5, 4) == set()

    def test_two_cliques_bridge(self):
        # two triangles sharing no vertex: each is maximal at gamma=1
        g = LocalGraph.from_edges(6, [(0, 1), (1, 2), (0, 2), (3, 4), (4, 5), (3, 5)])
        assert brute_force_maximal(g, 1.0, 3) == {
            frozenset({0, 1, 2}),
            frozenset({3, 4, 5}),
        }

    def test_valid_includes_non_maximal(self):
        g = complete(4)
        valid = brute_force_valid(g, 0.5, 3)
        assert frozenset({0, 1, 2}) in valid and frozenset(range(4)) in valid

    def test_maximality_against_unthresholded_supersets(self):
        # K4: {0,1,2} is size-3 valid but not maximal even with tau=3
        g = complete(4)
        assert frozenset({0, 1, 2}) not in brute_force_maximal(g, 0.5, 3)
