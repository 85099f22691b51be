"""Exact CS-AG baseline (§IV): enumeration with three pruning strategies.

The maximal connected k-core containing q is found first (Spark dataflow
for the bulk graph, or the local twin); the search-tree enumeration of
Algorithm 1 then runs on the driver — each state is a candidate community
obtained by peeling one more node, and the three prunings cut:

* **P1 duplicate states** — priority enumeration in descending f(·,q);
  a substate whose cascade-deleted max-f node v_m has
  ``f(v_m,q) > f(u,q)`` (u = the node whose deletion produced the parent)
  duplicates an earlier state (Theorems 3–4);
* **P2 unnecessary states** — only nodes with ``f(·,q) > δ(state)`` are
  worth deleting (Theorem 5);
* **P3 unpromising states** — prune the subtree when the lower bound
  ``δ̲`` (mean of the k smallest f in the state) reaches the best δ so far
  (Theorem 6, Eqs. 3–4).

Counters for explored states per pruning configuration feed Table IV.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Callable, Dict, List, Optional, Set, Tuple

from repro.graphs.local import (
    LocalGraph,
    delete_with_kcore_maintenance,
    delete_with_ktruss_maintenance,
    maximal_connected_kcore,
    maximal_connected_ktruss,
)
from repro.metrics.distance import (
    DEFAULT_GAMMA,
    NormStats,
    composite_distances_local,
    delta,
    norm_stats_local,
)

INF = float("inf")


@dataclass
class ExactResult:
    """Outcome of the exact enumeration."""

    community: Optional[Set[int]]
    delta: float
    states: int  # candidate states generated during enumeration
    pruned_duplicate: int
    pruned_unpromising: int
    elapsed_s: float
    capped: bool  # True when max_states stopped the search early
    fvals: Dict[int, float] = field(default_factory=dict, repr=False)


def _lower_bound(state: Set[int], q: int, fvals: Dict[int, float], m: int) -> float:
    """Eqs. 3–4: mean f of the m closest non-query members of the state."""
    others = sorted(fvals[v] for v in state if v != q)
    take = others[:m] if m > 0 else []
    return sum(take) / len(take) if take else 0.0


def exact_cs(
    g: LocalGraph,
    q: int,
    k: int,
    gamma: float = DEFAULT_GAMMA,
    stats: Optional[NormStats] = None,
    fvals: Optional[Dict[int, float]] = None,
    model: str = "core",
    prune_duplicate: bool = True,
    prune_unnecessary: bool = True,
    prune_unpromising: bool = True,
    max_states: Optional[int] = None,
) -> ExactResult:
    """Algorithm 1 over the maximal connected k-core (or k-truss) of q.

    ``fvals`` may be precomputed (e.g. collected from the Spark distance
    dataflow); otherwise the local twin computes it. With every pruning
    disabled this is the raw exponential enumeration — cap it with
    ``max_states`` (the result is then best-so-far with ``capped=True``).
    """
    t0 = time.perf_counter()
    if model == "core":
        root = maximal_connected_kcore(g, q, k)
        maintain = delete_with_kcore_maintenance
        min_others = k  # a k-core has ≥ k+1 nodes: q plus k others
    elif model == "truss":
        root = maximal_connected_ktruss(g, q, k)
        maintain = delete_with_ktruss_maintenance
        min_others = k - 1  # a k-truss has ≥ k nodes
    else:
        raise ValueError(f"unknown model {model!r}")
    if not root:
        return ExactResult(None, INF, 0, 0, 0, time.perf_counter() - t0, False)
    if fvals is None:
        if stats is None:
            stats = norm_stats_local(g)
        fvals = composite_distances_local(g, q, gamma, stats, nodes=root)

    best: Dict[str, object] = {
        "delta": delta(fvals, root, q),
        "community": set(root),
    }
    counters = {"states": 0, "dup": 0, "unpromising": 0, "capped": False}

    def enumerate_from(state: Set[int], state_delta: float, f_u: float) -> None:
        if counters["capped"]:
            return
        if prune_unpromising:
            lb = _lower_bound(state, q, fvals, min_others)
            if lb >= best["delta"]:
                counters["unpromising"] += 1
                return
        if prune_unnecessary:
            candidates = [v for v in state if v != q and fvals[v] > state_delta]
        else:
            candidates = [v for v in state if v != q]
        # priority enumeration: descending composite distance to q
        candidates.sort(key=lambda v: (-fvals[v], v))
        for v in candidates:
            if counters["capped"]:
                return
            if max_states is not None and counters["states"] >= max_states:
                counters["capped"] = True
                return
            new_state, removed = maintain(g, state, q, k, v)
            counters["states"] += 1
            if not new_state:
                continue  # q collapsed out — dead branch
            f_vm = max(fvals[u] for u in removed)
            if prune_duplicate and f_vm > f_u:
                counters["dup"] += 1
                continue  # Theorem 4: duplicates an earlier state
            nd = delta(fvals, new_state, q)
            if nd < best["delta"]:
                best["delta"] = nd
                best["community"] = set(new_state)
            enumerate_from(new_state, nd, fvals[v])

    import sys

    old_limit = sys.getrecursionlimit()
    sys.setrecursionlimit(max(old_limit, len(root) * 4 + 1000))
    try:
        enumerate_from(set(root), float(best["delta"]), INF)
    finally:
        sys.setrecursionlimit(old_limit)

    return ExactResult(
        community=set(best["community"]),
        delta=float(best["delta"]),
        states=counters["states"],
        pruned_duplicate=counters["dup"],
        pruned_unpromising=counters["unpromising"],
        elapsed_s=time.perf_counter() - t0,
        capped=bool(counters["capped"]),
        fvals=dict(fvals),
    )


def brute_force_cs(
    g: LocalGraph,
    q: int,
    k: int,
    gamma: float = DEFAULT_GAMMA,
    stats: Optional[NormStats] = None,
    model: str = "core",
) -> Tuple[Optional[Set[int]], float]:
    """Reference oracle: try *every* subset of the root community.

    Exponential — only usable for |root| ≤ ~16 in tests, where it
    certifies that the pruned enumeration still finds the optimum.
    """
    from itertools import combinations

    if model == "core":
        root = maximal_connected_kcore(g, q, k)
        check = lambda s: maximal_connected_kcore(g, q, k, within=set(s)) == set(s)
    else:
        root = maximal_connected_ktruss(g, q, k)
        check = lambda s: maximal_connected_ktruss(g, q, k, within=set(s)) == set(s)
    if not root:
        return None, INF
    if stats is None:
        stats = norm_stats_local(g)
    fvals = composite_distances_local(g, q, gamma, stats, nodes=root)
    others = sorted(root - {q})
    best_c, best_d = None, INF
    for r in range(len(others) + 1):
        for comb in combinations(others, r):
            cand = set(comb) | {q}
            if len(cand) < 2:
                continue
            if check(cand):
                d = delta(fvals, cand, q)
                if d < best_d:
                    best_c, best_d = cand, d
    return best_c, best_d
