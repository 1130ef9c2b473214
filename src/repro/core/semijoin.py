"""The Yannakakis baseline's semi-join phase (§2.2, evaluated in §4).

A BFS spanning tree is built from a chosen root (cycle edges dropped —
the paper's §4.1 extension for cyclic queries). The forward pass walks
the tree bottom-up semi-joining each parent with its (already reduced)
children; the backward pass walks top-down semi-joining each child with
its reduced parent. Semi-joins are exact Spark ``LEFT SEMI`` joins —
with broadcast joins disabled these shuffle both inputs, which is this
substrate's analogue of the paper's "costly hash table probes".

Direction restrictions from §3.4 edges (outer/anti) are honoured: a
semi-join that would transfer along a forbidden direction is skipped.
"""
from __future__ import annotations

from typing import Dict, List, Mapping, Sequence, Tuple

from pyspark.sql import DataFrame

from repro.core.graph import JoinTree, bfs_join_tree
from repro.core.spec import Edge


def _semi(reducee: DataFrame, t_reducee: str, reducer: DataFrame, e: Edge) -> DataFrame:
    """``reducee ⋉ reducer`` along edge ``e`` (equi keys only — the
    semi-join may keep a superset of strictly-necessary rows when the
    edge carries an extra non-equi condition, which is still sound)."""
    own = e.cols_of(t_reducee)
    other = e.cols_of(e.other(t_reducee))
    cond = None
    for a, b in zip(own, other):
        c = reducee[a] == reducer[b]
        cond = c if cond is None else (cond & c)
    return reducee.join(reducer, cond, "leftsemi")


def yannakakis_reduce(
    tables: Mapping[str, DataFrame],
    edges: Sequence[Edge],
    root: str,
) -> Tuple[Dict[str, DataFrame], JoinTree]:
    """Forward + backward semi-join passes over the BFS join tree;
    returns the reduced (lazy) tables and the tree used."""
    tree = bfs_join_tree(list(tables), edges, root)
    cur: Dict[str, DataFrame] = dict(tables)
    # Forward (bottom-up): deepest nodes first; each node is already
    # reduced by its own children when it reduces its parent.
    for child in reversed(tree.bfs_order[1:]):
        parent, e = tree.parent[child]
        if e.can_transfer_from(child):
            cur[parent] = _semi(cur[parent], parent, cur[child], e)
    # Backward (top-down): each child reduced by its reduced parent.
    for child in tree.bfs_order[1:]:
        parent, e = tree.parent[child]
        if e.can_transfer_from(parent):
            cur[child] = _semi(cur[child], child, cur[parent], e)
    return cur, tree
