"""Deterministic synthetic graph generators.

The paper evaluates on 10 real graphs (Table 3). Offline we substitute
seeded synthetic stand-ins that preserve the *structural properties the
algorithms are sensitive to*:

* a heavy-tailed degree distribution (preferential attachment
  background) — drives the (P7) degenerate cover rule and k-core sizes;
* planted near-γ-dense communities — these survive the k-core prune and
  are exactly what makes quasi-clique tasks exponential; one or a few
  oversized communities reproduce the paper's straggler tasks;
* low-degree lattice / path topologies (USA-Road, kmer) where the
  k-core prune leaves almost nothing and tasks are uniformly tiny.

All generators return a canonical (src < dst, deduplicated) pandas edge
table, deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

__all__ = [
    "edges_pdf",
    "ba_graph",
    "er_graph",
    "grid_graph",
    "path_clique_graph",
    "planted_community_graph",
]


def edges_pdf(pairs: set[tuple[int, int]]) -> pd.DataFrame:
    """Canonicalize a set of undirected edges into a src<dst table."""
    canon = {(u, v) if u < v else (v, u) for u, v in pairs if u != v}
    if not canon:
        return pd.DataFrame({"src": np.array([], dtype=np.int64),
                             "dst": np.array([], dtype=np.int64)})
    arr = np.array(sorted(canon), dtype=np.int64)
    return pd.DataFrame({"src": arr[:, 0], "dst": arr[:, 1]})


def _canon(u: int, v: int) -> tuple[int, int]:
    return (u, v) if u < v else (v, u)


def ba_graph(n: int, m: int, seed: int = 0) -> set[tuple[int, int]]:
    """Barabási–Albert preferential attachment (repeated-targets trick):
    heavy-tailed degrees, the power-law background of social graphs."""
    rng = np.random.default_rng(seed)
    edges: set[tuple[int, int]] = set()
    targets = list(range(m))
    repeated: list[int] = []
    for v in range(m, n):
        for t in set(targets):
            edges.add(_canon(v, t))
            repeated.append(t)
            repeated.append(v)
        idx = rng.integers(0, len(repeated), m)
        targets = [repeated[i] for i in idx]
    return edges


def er_graph(n: int, p: float, seed: int = 0) -> set[tuple[int, int]]:
    """Erdős–Rényi G(n, p) via vectorized upper-triangle sampling."""
    rng = np.random.default_rng(seed)
    iu, ju = np.triu_indices(n, k=1)
    mask = rng.random(len(iu)) < p
    return {(int(a), int(b)) for a, b in zip(iu[mask], ju[mask])}


def grid_graph(rows: int, cols: int, keep: float = 1.0, seed: int = 0) -> set[tuple[int, int]]:
    """2-D lattice (road-network stand-in); ``keep`` < 1 drops edges at
    random to thin the mesh like a real road graph."""
    rng = np.random.default_rng(seed)
    edges: set[tuple[int, int]] = set()
    for r in range(rows):
        for c in range(cols):
            v = r * cols + c
            if c + 1 < cols and rng.random() < keep:
                edges.add(_canon(v, v + 1))
            if r + 1 < rows and rng.random() < keep:
                edges.add(_canon(v, v + cols))
    return edges


def path_clique_graph(
    n_paths: int, path_len: int, n_cliques: int, clique_size: int, seed: int = 0
) -> set[tuple[int, int]]:
    """kmer stand-in: long chains (|E|/|V| ≈ 1) plus a few tiny cliques
    that are the only structures surviving a k ≥ 2 core prune."""
    edges: set[tuple[int, int]] = set()
    nxt = 0
    for _ in range(n_paths):
        for i in range(path_len - 1):
            edges.add(_canon(nxt + i, nxt + i + 1))
        nxt += path_len
    for _ in range(n_cliques):
        for i in range(clique_size):
            for j in range(i + 1, clique_size):
                edges.add(_canon(nxt + i, nxt + j))
        nxt += clique_size
    return edges


def planted_community_graph(
    n: int,
    communities: list[tuple[int, float]],
    ba_m: int = 2,
    seed: int = 0,
    overlap: int = 0,
) -> set[tuple[int, int]]:
    """Power-law background + planted dense blocks.

    ``communities`` is a list of (size, p_in): each community is a
    uniformly random vertex block whose internal edges appear with
    probability p_in. ``overlap`` > 0 shifts consecutive blocks to share
    that many vertices (overlapping communities, as in social graphs).
    Vertices are drawn from the full id range so community members also
    carry background edges (realistic noisy neighbourhoods).
    """
    rng = np.random.default_rng(seed)
    edges = ba_graph(n, ba_m, seed=seed + 1)
    cursor = 0
    for size, p_in in communities:
        start = max(0, cursor - overlap)
        if start + size > n:
            start = int(rng.integers(0, max(1, n - size)))
        block = np.arange(start, start + size)
        cursor = start + size
        iu, ju = np.triu_indices(size, k=1)
        mask = rng.random(len(iu)) < p_in
        for a, b in zip(iu[mask], ju[mask]):
            edges.add(_canon(int(block[a]), int(block[b])))
    return edges
