"""Task-level execution shared by the serial and Spark engines.

A *task* is ⟨S, ext(S)⟩ plus the compact subgraph induced by S ∪ ext(S)
(Section 3). ``run_task`` executes one task under one of the paper's
three strategies and reports results, child subtasks (in global ids),
mining time and subgraph-materialization time — the two quantities
Tables 12–14 compare.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from ..core.bitset import bits
from ..core.gamma import Gamma, make_gamma
from ..core.graph import LocalGraph
from ..core.quickplus import QUICK_PLUS, MineConfig, Miner, MineStats

__all__ = ["TaskOutcome", "run_task", "STRATEGIES"]

STRATEGIES = ("base", "split", "time")


@dataclass
class TaskOutcome:
    """What one task produced."""

    results: list[frozenset[int]] = field(default_factory=list)  # global ids
    subtasks: list[tuple[frozenset[int], frozenset[int]]] = field(
        default_factory=list
    )  # (S, ext) in global ids
    mine_time: float = 0.0
    materialize_time: float = 0.0
    stats: MineStats = field(default_factory=MineStats)


def run_task(
    graph: LocalGraph,
    ids: list[int],
    s_mask: int,
    ext_mask: int,
    gamma: Gamma | float,
    tau_size: int,
    *,
    strategy: str = "base",
    tau_split: int = 50,
    tau_time: float = 1.0,
    cfg: MineConfig = QUICK_PLUS,
) -> TaskOutcome:
    """Execute iteration 3 of UDF compute() (Algorithms 8–10).

    ``strategy``:
      * ``base``  — Algorithm 3 in full (no decomposition).
      * ``split`` — Algorithm 8: decompose one level iff
        |ext(S)| > τ_split, else mine serially.
      * ``time``  — Algorithms 9/10: mine with a τ_time budget; on
        timeout every surviving branch becomes a subtask.
    """
    gam = make_gamma(gamma)
    miner = Miner(g=graph, gamma=gam, tau_size=tau_size, cfg=cfg)
    t0 = time.perf_counter()
    if strategy == "base":
        miner.recursive_mine(s_mask, ext_mask)
    elif strategy == "split":
        if ext_mask.bit_count() > tau_split:
            miner.split_level(s_mask, ext_mask)
        else:
            miner.recursive_mine(s_mask, ext_mask)
    elif strategy == "time":
        miner.time_delayed(s_mask, ext_mask, deadline=t0 + tau_time)
    else:  # pragma: no cover - guarded by callers
        raise ValueError(f"unknown strategy {strategy!r}")
    mine_time = time.perf_counter() - t0

    # Translating child (S, ext) masks back to global ids is part of the
    # subtask materialization cost (Alg 8 line 19 / Alg 10 lines 19-21).
    t1 = time.perf_counter()
    out = TaskOutcome(mine_time=mine_time, stats=miner.stats)
    out.results = [frozenset(ids[i] for i in s) for s in miner.results]
    for s_m, e_m in miner.subtasks:
        out.subtasks.append(
            (
                frozenset(ids[i] for i in bits(s_m)),
                frozenset(ids[i] for i in bits(e_m)),
            )
        )
    out.materialize_time = time.perf_counter() - t1
    return out
