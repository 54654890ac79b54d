"""Brute-force quasi-clique oracle for tests.

Enumerates every vertex subset of a small graph, so it is exact by
construction. Used to validate Quick+, the Quick emulation, and the
Spark engine on graphs of ≤ ~18 vertices.
"""
from __future__ import annotations

from itertools import combinations

from .bitset import bits
from .gamma import Gamma, make_gamma
from .graph import LocalGraph

__all__ = ["is_quasi_clique", "brute_force_maximal", "brute_force_valid"]


def is_quasi_clique(g: LocalGraph, vertex_mask: int, gamma: Gamma | float) -> bool:
    """Definition 1: connected and every vertex has degree ≥ ceil(γ(|S|-1))
    inside the induced subgraph. Connectivity is implied by the degree
    condition when γ ≥ 0.5 but is checked explicitly here since this is
    the definition-level predicate."""
    gam = make_gamma(gamma)
    s = vertex_mask.bit_count()
    if s == 0:
        return False
    need = gam.ceil_mul(s - 1)
    for v in bits(vertex_mask):
        if (g.adj[v] & vertex_mask).bit_count() < need:
            return False
    return g.connected(vertex_mask)


def brute_force_valid(
    g: LocalGraph, gamma: Gamma | float, tau_size: int
) -> set[frozenset[int]]:
    """All vertex sets S with |S| ≥ τ_size and G(S) a γ-quasi-clique."""
    gam = make_gamma(gamma)
    verts = [v for v in range(g.n)]
    out: set[frozenset[int]] = set()
    for r in range(tau_size, g.n + 1):
        for combo in combinations(verts, r):
            m = 0
            for v in combo:
                m |= 1 << v
            if is_quasi_clique(g, m, gam):
                out.add(frozenset(combo))
    return out


def brute_force_maximal(
    g: LocalGraph, gamma: Gamma | float, tau_size: int
) -> set[frozenset[int]]:
    """Definition 3: maximal γ-quasi-cliques with |S| ≥ τ_size.

    Maximality is against *all* quasi-clique supersets (of any size),
    not only those above the size threshold — matching Definition 2.
    """
    gam = make_gamma(gamma)
    valid_any_size: set[frozenset[int]] = set()
    for r in range(1, g.n + 1):
        for combo in combinations(range(g.n), r):
            m = 0
            for v in combo:
                m |= 1 << v
            if is_quasi_clique(g, m, gam):
                valid_any_size.add(frozenset(combo))
    out = set()
    for s in valid_any_size:
        if len(s) < tau_size:
            continue
        # quasi-cliques are not downward closed, so maximality must be
        # checked against every strict superset, not just |S|+1 ones.
        if not any(s < t for t in valid_any_size):
            out.add(s)
    return out
