"""Driver-side graph representation and graph algorithms.

The paper's per-query inner loops (branch-and-bound enumeration, greedy
peeling, k-core/k-truss maintenance after a deletion) are sequential and
operate on small candidate subgraphs (a maximal connected k-core, or the
induced graph of a sample). Those subgraphs are extracted with the Spark
primitives in :mod:`repro.spark_core` and collected into a
:class:`LocalGraph` for the inner loops — mirroring how the original
single-machine Java implementation runs them.

Every algorithm here has a Spark twin in ``spark_core`` for the bulk-graph
path; tests cross-validate the two.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field
from typing import Dict, FrozenSet, Iterable, List, Optional, Sequence, Set, Tuple

import numpy as np


@dataclass
class LocalGraph:
    """Undirected attributed graph held in driver memory.

    ``adj`` maps node id -> set of neighbour ids (symmetric).
    ``tattrs`` maps node id -> frozenset of textual attribute tokens.
    ``nattrs`` maps node id -> numpy vector of numerical attributes (all
    nodes share the same dimensionality; may be length 0).
    ``ntypes`` optionally maps node id -> node type (heterogeneous graphs).
    """

    adj: Dict[int, Set[int]]
    tattrs: Dict[int, FrozenSet[str]] = field(default_factory=dict)
    nattrs: Dict[int, np.ndarray] = field(default_factory=dict)
    ntypes: Optional[Dict[int, str]] = None

    @property
    def num_nodes(self) -> int:
        return len(self.adj)

    @property
    def num_edges(self) -> int:
        return sum(len(v) for v in self.adj.values()) // 2

    def nodes(self) -> List[int]:
        return list(self.adj)

    def degree(self, v: int) -> int:
        return len(self.adj[v])

    def subgraph(self, keep: Iterable[int]) -> "LocalGraph":
        """Node-induced subgraph (attribute dicts are shared, not copied)."""
        keep = set(keep)
        adj = {v: self.adj[v] & keep for v in keep}
        return LocalGraph(adj, self.tattrs, self.nattrs, self.ntypes)

    @staticmethod
    def from_edges(
        edges: Iterable[Tuple[int, int]],
        tattrs: Optional[Dict[int, Iterable[str]]] = None,
        nattrs: Optional[Dict[int, Sequence[float]]] = None,
        ntypes: Optional[Dict[int, str]] = None,
        nodes: Optional[Iterable[int]] = None,
    ) -> "LocalGraph":
        adj: Dict[int, Set[int]] = {}
        for v in nodes or ():
            adj.setdefault(int(v), set())
        for s, d in edges:
            s, d = int(s), int(d)
            if s == d:
                continue
            adj.setdefault(s, set()).add(d)
            adj.setdefault(d, set()).add(s)
        t = {int(v): frozenset(a) for v, a in (tattrs or {}).items()}
        n = {int(v): np.asarray(a, dtype=float) for v, a in (nattrs or {}).items()}
        return LocalGraph(adj, t, n, dict(ntypes) if ntypes else None)


# ---------------------------------------------------------------------------
# Core decomposition and k-core maintenance
# ---------------------------------------------------------------------------


def core_decomposition(g: LocalGraph) -> Dict[int, int]:
    """Batagelj–Zaveršnik peeling: coreness (core number) of every node.

    O(|E|) using bucket sort on degrees; this is the local twin of the
    iterative Spark peeling in ``spark_core.kcore``.
    """
    deg = {v: len(nbrs) for v, nbrs in g.adj.items()}
    if not deg:
        return {}
    max_deg = max(deg.values())
    buckets: List[Set[int]] = [set() for _ in range(max_deg + 1)]
    for v, d in deg.items():
        buckets[d].add(v)
    coreness: Dict[int, int] = {}
    removed: Set[int] = set()
    cur = 0
    for _ in range(len(deg)):
        while cur <= max_deg and not buckets[cur]:
            cur += 1
        if cur > max_deg:
            break
        v = buckets[cur].pop()
        coreness[v] = cur
        removed.add(v)
        for u in g.adj[v]:
            if u in removed:
                continue
            d = deg[u]
            if d > cur:
                buckets[d].discard(u)
                deg[u] = d - 1
                buckets[d - 1].add(u)
        # deg[u] can drop below cur only transiently; bucket index is
        # clamped by the `d > cur` guard above, so cur never decreases.
    return coreness


def kcore_nodes(g: LocalGraph, k: int, within: Optional[Set[int]] = None) -> Set[int]:
    """Nodes of the maximal (not necessarily connected) k-core.

    Peels nodes of degree < k until a fixpoint, restricted to ``within``
    when given.
    """
    nodes = set(g.adj) if within is None else set(within)
    deg = {v: sum(1 for u in g.adj[v] if u in nodes) for v in nodes}
    queue = deque(v for v, d in deg.items() if d < k)
    while queue:
        v = queue.popleft()
        if v not in nodes:
            continue
        nodes.discard(v)
        for u in g.adj[v]:
            if u in nodes:
                deg[u] -= 1
                if deg[u] < k:
                    queue.append(u)
    return nodes


def connected_component(
    g: LocalGraph, q: int, within: Optional[Set[int]] = None
) -> Set[int]:
    """BFS component of ``q`` restricted to ``within`` (or all nodes)."""
    nodes = set(g.adj) if within is None else within
    if q not in nodes:
        return set()
    seen = {q}
    queue = deque([q])
    while queue:
        v = queue.popleft()
        for u in g.adj[v]:
            if u in nodes and u not in seen:
                seen.add(u)
                queue.append(u)
    return seen


def maximal_connected_kcore(
    g: LocalGraph, q: int, k: int, within: Optional[Set[int]] = None
) -> Set[int]:
    """Node set of the maximal connected k-core containing ``q`` (∅ if none).

    Peel to the k-core, then take q's component: inside a component every
    neighbour is in the same component, so degrees are unchanged by the
    restriction and the result is still a k-core.
    """
    core = kcore_nodes(g, k, within)
    if q not in core:
        return set()
    return connected_component(g, q, core)


def delete_with_kcore_maintenance(
    g: LocalGraph, state: Set[int], q: int, k: int, v: int
) -> Tuple[Set[int], List[int]]:
    """Delete ``v`` from a connected-k-core state and restore the invariant.

    Cascade-removes nodes whose degree drops below ``k``, then restricts to
    q's component. Returns ``(new_state, removed)`` where ``removed`` lists
    every node that left the state (v first; includes nodes cut off by the
    connectivity restriction, which the duplicate-pruning rule of §IV-B
    must also see). ``new_state`` is ∅ when q itself is removed.
    """
    nodes = set(state)
    nodes.discard(v)
    removed = [v]
    deg = {u: sum(1 for w in g.adj[u] if w in nodes) for u in nodes}
    queue = deque(u for u in g.adj[v] if u in nodes and deg[u] < k)
    while queue:
        u = queue.popleft()
        if u not in nodes:
            continue
        nodes.discard(u)
        removed.append(u)
        for w in g.adj[u]:
            if w in nodes:
                deg[w] -= 1
                if deg[w] < k:
                    queue.append(w)
    if q not in nodes:
        return set(), removed + []
    comp = connected_component(g, q, nodes)
    removed.extend(nodes - comp)
    return comp, removed


# ---------------------------------------------------------------------------
# Triangles and k-truss
# ---------------------------------------------------------------------------


def edge_supports(
    g: LocalGraph, within: Optional[Set[int]] = None
) -> Dict[Tuple[int, int], int]:
    """Support (number of triangles) of each edge, keyed (min, max)."""
    nodes = set(g.adj) if within is None else within
    sup: Dict[Tuple[int, int], int] = {}
    for v in nodes:
        for u in g.adj[v]:
            if u in nodes and v < u:
                common = g.adj[v] & g.adj[u] & nodes
                sup[(v, u)] = len(common)
    return sup


def ktruss_edges(
    g: LocalGraph, k: int, within: Optional[Set[int]] = None
) -> Set[Tuple[int, int]]:
    """Edges of the maximal k-truss: every edge is in ≥ k−2 triangles.

    Iterative peeling of low-support edges; support is recounted against the
    surviving edge set each round (candidate subgraphs here are small).
    """
    nodes = set(g.adj) if within is None else set(within)
    edges = {(v, u) for v in nodes for u in g.adj[v] if u in nodes and v < u}
    need = max(0, k - 2)
    changed = True
    while changed and edges:
        adj: Dict[int, Set[int]] = {}
        for v, u in edges:
            adj.setdefault(v, set()).add(u)
            adj.setdefault(u, set()).add(v)
        drop = {
            (v, u)
            for v, u in edges
            if len(adj[v] & adj[u]) < need
        }
        changed = bool(drop)
        edges -= drop
    return edges


def maximal_connected_ktruss(
    g: LocalGraph, q: int, k: int, within: Optional[Set[int]] = None
) -> Set[int]:
    """Node set of the connected k-truss community containing ``q``.

    Peels edges to the maximal k-truss, then walks q's component over the
    surviving edges. Returns ∅ when q has no surviving edge.
    """
    edges = ktruss_edges(g, k, within)
    adj: Dict[int, Set[int]] = {}
    for v, u in edges:
        adj.setdefault(v, set()).add(u)
        adj.setdefault(u, set()).add(v)
    if q not in adj:
        return set()
    seen = {q}
    queue = deque([q])
    while queue:
        v = queue.popleft()
        for u in adj[v]:
            if u not in seen:
                seen.add(u)
                queue.append(u)
    return seen


def delete_with_ktruss_maintenance(
    g: LocalGraph, state: Set[int], q: int, k: int, v: int
) -> Tuple[Set[int], List[int]]:
    """Truss twin of :func:`delete_with_kcore_maintenance`.

    Recomputes the connected k-truss of ``state − v`` (states are small, so
    recomputation beats incremental bookkeeping here) and reports every node
    that left the state, v first.
    """
    nodes = set(state)
    nodes.discard(v)
    comp = maximal_connected_ktruss(g, q, k, within=nodes)
    removed = [v] + sorted(state - {v} - comp)
    if not comp:
        return set(), removed
    return comp, removed
