"""Algorithm 2 (iterative_bounding) unit behaviors."""
import random

import pytest

from repro.core.bitset import bits, mask_of
from repro.core.brute import is_quasi_clique
from repro.core.gamma import make_gamma
from repro.core.graph import LocalGraph
from repro.core.quickplus import QUICK_ORIGINAL, QUICK_PLUS, MineConfig, Miner


def miner_for(n, edges, gamma=0.9, tau=3, cfg=QUICK_PLUS):
    g = LocalGraph.from_edges(n, edges)
    return Miner(g=g, gamma=make_gamma(gamma), tau_size=tau, cfg=cfg)


class TestReturnContract:
    def test_false_implies_nonempty_ext(self):
        rng = random.Random(0)
        for _ in range(50):
            n = rng.randint(4, 10)
            edges = [
                (u, v) for u in range(n) for v in range(u + 1, n)
                if rng.random() < 0.6
            ]
            m = miner_for(n, edges, gamma=rng.choice([0.6, 0.8, 0.9]))
            s0 = rng.randrange(n)
            ext0 = mask_of(v for v in range(n) if v != s0 and rng.random() < 0.8)
            if not ext0:
                continue
            pruned, s, ext = m.iterative_bounding(1 << s0, ext0)
            if not pruned:
                assert ext != 0
            assert s & ext == 0
            assert s & (1 << s0)  # S only grows

    def test_emitted_sets_always_valid(self):
        rng = random.Random(1)
        for _ in range(50):
            n = rng.randint(4, 10)
            edges = [
                (u, v) for u in range(n) for v in range(u + 1, n)
                if rng.random() < 0.7
            ]
            m = miner_for(n, edges, gamma=0.8, tau=3)
            s0 = rng.randrange(n)
            ext0 = mask_of(v for v in range(n) if v != s0)
            m.iterative_bounding(1 << s0, ext0)
            for res in m.results:
                assert is_quasi_clique(m.g, mask_of(res), 0.8)
                assert len(res) >= 3


class TestCriticalMove:
    def test_critical_vertex_forces_neighbors_in(self):
        # S = {0,1} non-adjacent, ext = {2} adjacent to both, γ=0.5:
        # d_S_min = 0 < ceil(0.5·1) so L_S = 1, and vertex 0 has
        # d_S + d_ext = 1 = ceil(0.5·(2+1-1)) → critical → 2 is forced
        # into S, giving the valid path {0,1,2}.
        m = miner_for(3, [(0, 2), (1, 2)], gamma=0.5, tau=3)
        pruned, s, ext = m.iterative_bounding(mask_of({0, 1}), mask_of({2}))
        assert set(bits(s)) == {0, 1, 2}
        assert pruned  # ext exhausted; path emitted as candidate
        assert frozenset({0, 1, 2}) in m.results

    def test_quick_single_critical_still_sound(self):
        m = miner_for(3, [(0, 2), (1, 2)], gamma=0.5, tau=3,
                      cfg=QUICK_ORIGINAL)
        m.iterative_bounding(mask_of({0, 1}), mask_of({2}))
        for res in m.results:
            assert is_quasi_clique(m.g, mask_of(res), 0.5)


class TestTypeIIPruning:
    def test_hopeless_s_pruned_without_emit(self):
        # 0 isolated from ext: S={0}, ext={1,2} with no 0-edges; gamma=0.9
        m = miner_for(3, [(1, 2)], gamma=0.9, tau=2)
        pruned, s, ext = m.iterative_bounding(mask_of({0}), mask_of({1, 2}))
        assert pruned
        assert not m.results  # S itself is an invalid singleton here

    def test_stats_counters_advance(self):
        rng = random.Random(2)
        n = 10
        edges = [(u, v) for u in range(n) for v in range(u + 1, n)
                 if rng.random() < 0.4]
        m = miner_for(n, edges, gamma=0.9, tau=4)
        m.iterative_bounding(mask_of({0}), mask_of(range(1, n)))
        s = m.stats
        assert s.t_bounds >= 0
        assert s.n_type1_pruned >= 0 and s.n_type2_pruned >= 0


class TestEmitDedup:
    def test_duplicate_emissions_counted_once(self):
        m = miner_for(3, [(0, 1), (0, 2), (1, 2)], gamma=1.0, tau=3)
        assert m._emit_if_valid(mask_of({0, 1, 2}))
        assert m._emit_if_valid(mask_of({0, 1, 2}))
        assert m.stats.n_emitted == 1 and len(m.results) == 1

    def test_invalid_not_emitted(self):
        m = miner_for(3, [(0, 1)], gamma=1.0, tau=2)
        assert not m._emit_if_valid(mask_of({0, 1, 2}))
        assert not m.results


class TestGammaBelowHalf:
    def test_connectivity_checked_when_gamma_small(self):
        # two disjoint edges: with gamma=0.3 and |S|=4 the degree bound
        # is ceil(0.3*3)=1, which both components satisfy — only the
        # connectivity check rejects the union.
        m = miner_for(4, [(0, 1), (2, 3)], gamma=0.3, tau=4)
        assert not m._is_qc(mask_of({0, 1, 2, 3}))
