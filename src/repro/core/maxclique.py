"""Branch-and-bound maximum clique (Tomita-style greedy colouring).

Substrate for Table 4's Maximum Clique Finding workload: each
G-thinker task runs this on a per-vertex ego subgraph. Bitmask-based,
exact; validated against brute force in tests.
"""
from __future__ import annotations

from .bitset import bits
from .graph import LocalGraph

__all__ = ["max_clique"]


def _greedy_color_order(g: LocalGraph, cand: int) -> list[tuple[int, int]]:
    """Greedy colouring of candidates; returns (vertex, color) in
    ascending color order. max color of a set bounds its clique size."""
    order: list[tuple[int, int]] = []
    color = 0
    left = cand
    while left:
        color += 1
        avail = left
        while avail:
            v = (avail & -avail).bit_length() - 1
            order.append((v, color))
            avail &= ~g.adj[v]
            avail &= ~(1 << v)
            left &= ~(1 << v)
    return order


def max_clique(g: LocalGraph, within: int | None = None) -> int:
    """Bitmask of a maximum clique of ``g`` (restricted to ``within``)."""
    cand0 = within if within is not None else (1 << g.n) - 1
    best = [0]

    def expand(clique: int, cand: int) -> None:
        if cand == 0:
            if clique.bit_count() > best[0].bit_count():
                best[0] = clique
            return
        order = _greedy_color_order(g, cand)
        for v, color in reversed(order):
            if clique.bit_count() + color <= best[0].bit_count():
                return  # colour bound prunes this and all earlier vertices
            expand(clique | (1 << v), cand & g.adj[v])
            cand &= ~(1 << v)

    expand(0, cand0)
    return best[0]
