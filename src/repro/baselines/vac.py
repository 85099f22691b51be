"""VAC [Liu et al., ICDE'20]: vertex-centric attributed community search.

VAC minimises the *maximum pairwise* attribute distance inside the
community (a worst-case objective — the contrast with the paper's
q-centric δ). Two variants, both for k-core and k-truss substrates:

* :func:`vac_search` — the approximate peeling the paper compares
  against: repeatedly locate the worst (most distant) pair and try to
  remove one of its endpoints; halt when neither endpoint can be removed
  without collapsing q's community or when removal stops improving the
  objective (the Fig. 1(d) behaviour);
* :func:`evac_search` — the exact variant (E-VAC): branch-and-bound over
  deletion sequences with memoised states, minimising the min-max
  objective. Exponential — the paper could not finish it on large
  graphs within a week; ``max_states`` caps it and flags the result.
"""
from __future__ import annotations

from itertools import combinations
from typing import Dict, FrozenSet, Optional, Set, Tuple

from repro.graphs.local import LocalGraph
from repro.metrics.distance import DEFAULT_GAMMA, NormStats, norm_stats_local, pair_distance

from .common import model_ops, timed


def _worst_pair(
    g: LocalGraph, comm: Set[int], gamma: float, stats: NormStats
) -> Tuple[float, int, int]:
    m, wu, wv = -1.0, -1, -1
    for u, v in combinations(sorted(comm), 2):
        d = pair_distance(g, u, v, gamma, stats)
        if d > m:
            m, wu, wv = d, u, v
    return m, wu, wv


@timed
def vac_search(
    g: LocalGraph,
    q: int,
    k: int,
    gamma: float = DEFAULT_GAMMA,
    stats: Optional[NormStats] = None,
    model: str = "core",
) -> Optional[Set[int]]:
    """Approximate VAC: peel endpoints of the worst pair while possible."""
    initial, maintain, _ = model_ops(model)
    comm = initial(g, q, k)
    if not comm:
        return None
    if stats is None:
        stats = norm_stats_local(g)
    while len(comm) > k + 1:
        m, u, v = _worst_pair(g, comm, gamma, stats)
        improved = False
        for x in (u, v):
            if x == q:
                continue
            cand, _ = maintain(g, comm, q, k, x)
            if cand and _worst_pair(g, cand, gamma, stats)[0] < m:
                comm = cand
                improved = True
                break
        if not improved:
            break  # worst case cannot be improved — VAC halts (Fig. 1d)
    return comm


@timed
def evac_search(
    g: LocalGraph,
    q: int,
    k: int,
    gamma: float = DEFAULT_GAMMA,
    stats: Optional[NormStats] = None,
    model: str = "core",
    max_states: int = 50_000,
) -> Tuple[Optional[Set[int]], int, bool]:
    """Exact VAC: enumerate deletion-closed states, minimise min-max."""
    initial, maintain, _ = model_ops(model)
    root = initial(g, q, k)
    if not root:
        return None, 0, False
    if stats is None:
        stats = norm_stats_local(g)

    best: Dict[str, object] = {"obj": _worst_pair(g, root, gamma, stats)[0], "comm": set(root)}
    seen: Set[FrozenSet[int]] = {frozenset(root)}
    counters = {"states": 0, "capped": False}

    def visit(state: Set[int]) -> None:
        if counters["capped"]:
            return
        obj, u, v = _worst_pair(g, state, gamma, stats)
        if obj < best["obj"]:
            best["obj"], best["comm"] = obj, set(state)
        # only deleting an endpoint of the worst pair can reduce the
        # objective — the classic min-max branching rule
        for x in (u, v):
            if x == q or counters["capped"]:
                continue
            if counters["states"] >= max_states:
                counters["capped"] = True
                return
            cand, _ = maintain(g, state, q, k, x)
            counters["states"] += 1
            key = frozenset(cand)
            if cand and key not in seen:
                seen.add(key)
                visit(cand)

    import sys

    old = sys.getrecursionlimit()
    sys.setrecursionlimit(max(old, len(root) * 4 + 1000))
    try:
        visit(set(root))
    finally:
        sys.setrecursionlimit(old)
    return set(best["comm"]), counters["states"], counters["capped"]
