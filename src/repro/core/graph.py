"""Join-graph algorithms: predicate-transfer-graph orientation, topological
scheduling, and the BFS join tree used by the Yannakakis baseline.

Orientation implements the paper's §3.2 heuristic verbatim: every
join-graph edge is kept and pointed from the smaller table to the
bigger table. Because "smaller than" (with a deterministic name tie-
break) is a total order on tables, the free edges can never form a
cycle; direction-restricted edges (outer/anti, §3.4) are forced to
their only legal direction and dropped if that would close a cycle.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass
from typing import Dict, List, Mapping, Sequence, Tuple

from repro.core.spec import Edge


@dataclass(frozen=True)
class DirectedEdge:
    """One transfer: a filter on ``src``'s ``src_cols`` applied to
    ``dst``'s ``dst_cols``. Keeps a handle to the original edge."""

    src: str
    src_cols: Tuple[str, ...]
    dst: str
    dst_cols: Tuple[str, ...]
    edge: Edge


def _directed(edge: Edge, src: str) -> DirectedEdge:
    dst = edge.other(src)
    return DirectedEdge(src, edge.cols_of(src), dst, edge.cols_of(dst), edge)


def _reaches(adj: Mapping[str, List[str]], start: str, goal: str) -> bool:
    seen, stack = {start}, [start]
    while stack:
        u = stack.pop()
        if u == goal:
            return True
        for v in adj.get(u, ()):
            if v not in seen:
                seen.add(v)
                stack.append(v)
    return False


def orient(edges: Sequence[Edge], sizes: Mapping[str, int]) -> List[DirectedEdge]:
    """Build the predicate transfer graph (a DAG): free edges point
    small→big; forced edges keep their declared direction unless that
    would create a cycle (then they are skipped — the transfer is
    simply not performed, which is always sound)."""

    def rank(t: str) -> Tuple[int, str]:
        return (sizes.get(t, 0), t)

    out: List[DirectedEdge] = []
    forced: List[DirectedEdge] = []
    for e in edges:
        if e.transfer == "none":
            continue
        if e.transfer == "both":
            src = e.left if rank(e.left) <= rank(e.right) else e.right
            out.append(_directed(e, src))
        else:
            forced.append(_directed(e, e.left if e.transfer == "ltr" else e.right))
    adj: Dict[str, List[str]] = {}
    for d in out:
        adj.setdefault(d.src, []).append(d.dst)
    for d in forced:
        if _reaches(adj, d.dst, d.src):
            continue  # would close a cycle; skip this transfer
        out.append(d)
        adj.setdefault(d.src, []).append(d.dst)
    return out


def topological_order(nodes: Sequence[str], dag: Sequence[DirectedEdge]) -> List[str]:
    """Kahn topological order (deterministic: FIFO over sorted seeds)."""
    indeg = {n: 0 for n in nodes}
    adj: Dict[str, List[str]] = {n: [] for n in nodes}
    for d in dag:
        indeg[d.dst] += 1
        adj[d.src].append(d.dst)
    q = deque(sorted(n for n in nodes if indeg[n] == 0))
    order: List[str] = []
    while q:
        u = q.popleft()
        order.append(u)
        for v in sorted(adj[u]):
            indeg[v] -= 1
            if indeg[v] == 0:
                q.append(v)
    if len(order) != len(nodes):
        raise ValueError("transfer graph has a cycle")
    return order


def reverse_dag(dag: Sequence[DirectedEdge]) -> List[DirectedEdge]:
    """Edges for the backward pass: every DAG edge reversed, keeping only
    reversals the edge's transfer mode allows (§3.4 one-way edges take
    part in a single pass)."""
    rev = []
    for d in dag:
        if d.edge.can_transfer_from(d.dst):
            rev.append(DirectedEdge(d.dst, d.dst_cols, d.src, d.src_cols, d.edge))
    return rev


@dataclass
class JoinTree:
    """Rooted spanning tree for the Yannakakis baseline."""

    root: str
    parent: Dict[str, Tuple[str, Edge]]  # child -> (parent, connecting edge)
    bfs_order: List[str]  # root first
    dropped_edges: List[Edge]  # cycle edges not in the tree


def bfs_join_tree(nodes: Sequence[str], edges: Sequence[Edge], root: str) -> JoinTree:
    """Break cycles by BFS from ``root`` (the paper's §4.1 extension for
    cyclic queries like Q5/Q9); non-tree edges are dropped from the
    semi-join phase."""
    adj: Dict[str, List[Tuple[str, Edge]]] = {n: [] for n in nodes}
    for e in edges:
        if e.transfer == "none":
            continue
        adj[e.left].append((e.right, e))
        adj[e.right].append((e.left, e))
    parent: Dict[str, Tuple[str, Edge]] = {}
    order = [root]
    seen = {root}
    used_edges = set()
    q = deque([root])
    while q:
        u = q.popleft()
        for v, e in sorted(adj[u], key=lambda p: p[0]):
            if v not in seen:
                seen.add(v)
                parent[v] = (u, e)
                used_edges.add(id(e))
                order.append(v)
                q.append(v)
    if seen != set(nodes):
        raise ValueError(f"join graph disconnected from root {root}: missing {set(nodes)-seen}")
    dropped = [e for e in edges if e.transfer != "none" and id(e) not in used_edges]
    return JoinTree(root=root, parent=parent, bfs_order=order, dropped_edges=dropped)
