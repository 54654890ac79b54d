"""Postprocessing: remove non-maximal quasi-cliques from the result set.

The set-enumeration search outputs *candidate* quasi-cliques that may be
contained in other results found by sibling tasks (Section 3). The paper
uses a prefix-tree over result vertex sets; at our scale an inverted
index (vertex -> results containing it) gives the same asymptotic
benefit with far less code: a set S only needs subset checks against
the strictly larger results that share at least one vertex with it.
"""
from __future__ import annotations

import time
from collections import defaultdict
from typing import Iterable

__all__ = ["maximal_only", "timed_maximal_only"]


def maximal_only(results: Iterable[frozenset[int]]) -> set[frozenset[int]]:
    """Filter to sets not strictly contained in any other result."""
    res = list(set(results))
    res.sort(key=len, reverse=True)
    index: dict[int, list[int]] = defaultdict(list)  # vertex -> kept result idx
    kept: list[frozenset[int]] = []
    for s in res:
        v0 = min(s, key=lambda v: len(index[v]), default=None)
        dominated = False
        if v0 is not None:
            for i in index[v0]:
                t = kept[i]
                if len(t) > len(s) and s < t:
                    dominated = True
                    break
        if not dominated:
            idx = len(kept)
            kept.append(s)
            for v in s:
                index[v].append(idx)
    return set(kept)


def timed_maximal_only(
    results: Iterable[frozenset[int]],
) -> tuple[set[frozenset[int]], float]:
    """(maximal set, elapsed seconds) — the Table 7 postprocessing time."""
    t0 = time.perf_counter()
    out = maximal_only(results)
    return out, time.perf_counter() - t0
