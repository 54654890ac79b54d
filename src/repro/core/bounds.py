"""Pruning-rule mathematics for Quick+ — Section 6.1 of the paper.

Pure functions over a :class:`~repro.core.graph.LocalGraph` and two
vertex-set masks ``S`` and ``ext(S)``. Everything here is exact integer
arithmetic (see :mod:`repro.core.gamma`); the iterative driver that
applies these rules lives in :mod:`repro.core.quickplus`.

Naming follows the paper:

* SS-degree ``d_S(v)`` for ``v ∈ S``; SE-degree ``d_S(u)`` for
  ``u ∈ ext(S)``; ES-degree ``d_ext(v)``; EE-degree ``d_ext(u)``.
* ``U_S`` — Eq (3)/(4) upper bound on how many ext vertices can join S.
* ``L_S`` — Eq (7)/(8) lower bound on how many must join S.
"""
from __future__ import annotations

from .bitset import bits
from .gamma import Gamma
from .graph import LocalGraph

__all__ = [
    "upper_bound",
    "lower_bound",
    "critical_vertices",
    "cover_set",
    "best_cover_vertex",
]


def _sorted_se_prefix(g: LocalGraph, S: int, ext: int) -> list[int]:
    """Prefix sums of SE-degrees d_S(u), u ∈ ext, sorted non-increasing
    (the order Lemma 2 requires). prefix[t] = sum of the t largest."""
    se = sorted((g.adj[u] & S).bit_count() for u in bits(ext))
    se.reverse()
    prefix = [0]
    acc = 0
    for d in se:
        acc += d
        prefix.append(acc)
    return prefix


def upper_bound(g: LocalGraph, S: int, ext: int, gam: Gamma) -> int | None:
    """U_S of Eq (4), or ``None`` when no valid t exists (a Type II
    pruning of S's *extensions*; G(S) itself stays a candidate).

    Requires S non-empty and γ > 0 (the paper's regime is γ ≥ 0.5).
    """
    s = S.bit_count()
    n_ext = ext.bit_count()
    d_min = min(
        (g.adj[v] & S).bit_count() + (g.adj[v] & ext).bit_count()
        for v in bits(S)
    )
    u_min = gam.floor_div(d_min) + 1 - s  # Eq (3)
    u_cap = min(u_min, n_ext)
    if u_cap < 1:
        return None
    sum_ss = sum((g.adj[v] & S).bit_count() for v in bits(S))
    prefix = _sorted_se_prefix(g, S, ext)
    for t in range(u_cap, 0, -1):  # Eq (4): the max t satisfying Lemma 2
        if sum_ss + prefix[t] >= s * gam.ceil_mul(s + t - 1):
            return t
    return None


def lower_bound(g: LocalGraph, S: int, ext: int, gam: Gamma) -> int | None:
    """L_S of Eq (8), or ``None`` when no valid t exists (a Type II
    pruning of S *and* its extensions)."""
    s = S.bit_count()
    n_ext = ext.bit_count()
    d_s_min = min((g.adj[v] & S).bit_count() for v in bits(S))
    l_min = None
    for t in range(0, n_ext + 1):  # Eq (7)
        if d_s_min + t >= gam.ceil_mul(s + t - 1):
            l_min = t
            break
    if l_min is None:
        return None
    sum_ss = sum((g.adj[v] & S).bit_count() for v in bits(S))
    prefix = _sorted_se_prefix(g, S, ext)
    for t in range(l_min, n_ext + 1):  # Eq (8): the min t satisfying Lemma 2
        if sum_ss + prefix[t] >= s * gam.ceil_mul(s + t - 1):
            return t
    return None


def critical_vertices(
    g: LocalGraph, S: int, ext: int, gam: Gamma, l_s: int
) -> list[int]:
    """Definition 4: v ∈ S with d_S(v) + d_ext(v) == ceil(γ(|S|+L_S-1)).
    Any valid extension must then absorb all of N_ext(v) (Theorem 9)."""
    s = S.bit_count()
    need = gam.ceil_mul(s + l_s - 1)
    out = []
    for v in bits(S):
        if (g.adj[v] & S).bit_count() + (g.adj[v] & ext).bit_count() == need:
            out.append(v)
    return out


def cover_set(g: LocalGraph, S: int, ext: int, gam: Gamma, u: int) -> int | None:
    """C_S(u) of Eq (9) for a candidate cover vertex u ∈ ext, or ``None``
    when (P7)'s applicability conditions fail:
    d_S(u) ≥ ceil(γ|S|) and every non-neighbor v ∈ S of u has
    d_S(v) ≥ ceil(γ|S|)."""
    s = S.bit_count()
    thr = gam.ceil_mul(s)
    if (g.adj[u] & S).bit_count() < thr:
        return None
    c = g.adj[u] & ext
    for v in bits(S & ~g.adj[u]):
        if (g.adj[v] & S).bit_count() < thr:
            return None
        c &= g.adj[v]
    return c


def best_cover_vertex(
    g: LocalGraph, S: int, ext: int, gam: Gamma
) -> tuple[int | None, int]:
    """(P7): the u ∈ ext maximizing |C_S(u)|, with the short-circuit the
    paper describes — skip u once |N_ext(u)| cannot beat the current
    best. Degenerate case S = ∅: C = N(u) ∩ ext, u of max degree.
    Returns (u, C_mask); (None, 0) when no cover vertex applies."""
    best_u, best_c, best_sz = None, 0, 0
    for u in bits(ext):
        if (g.adj[u] & ext).bit_count() <= best_sz:
            continue
        c = cover_set(g, S, ext, gam, u) if S else (g.adj[u] & ext)
        if c is not None and c.bit_count() > best_sz:
            best_u, best_c, best_sz = u, c, c.bit_count()
    return best_u, best_c
