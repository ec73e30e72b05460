"""Shared test fixtures/utilities: tiny graphs and reference implementations.

The reference implementations here are deliberately naive pure-Python code
(dict adjacency, per-edge loops) so the vectorized kernels are checked
against an independently written semantics, not against themselves.
"""
import numpy as np
import pandas as pd

from repro.graphs.csr import CSRGraph, from_pandas


def graph_from_edges(edges, p=None, n=None) -> CSRGraph:
    """edges: list of (src, dst) or (src, dst, p)."""
    rows = []
    for e in edges:
        if len(e) == 3:
            rows.append({"src": e[0], "dst": e[1], "p": e[2]})
        else:
            rows.append({"src": e[0], "dst": e[1], "p": p if p is not None else 1.0})
    return from_pandas(pd.DataFrame(rows), n)


def path_graph(k: int, p: float = 1.0) -> CSRGraph:
    """0 → 1 → ... → k-1, each edge with probability p."""
    return graph_from_edges([(i, i + 1, p) for i in range(k - 1)], n=k)


def star_graph(leaves: int, p: float = 1.0) -> CSRGraph:
    """0 → 1..leaves."""
    return graph_from_edges([(0, i, p) for i in range(1, leaves + 1)])


def random_tiny_graph(rng, n=6, m=9) -> CSRGraph:
    """Random simple digraph with random probabilities (for exact tests)."""
    edges = set()
    while len(edges) < m:
        u, v = rng.integers(0, n, 2)
        if u != v:
            edges.add((int(u), int(v)))
    return graph_from_edges(
        [(u, v, float(rng.uniform(0.1, 0.9))) for u, v in sorted(edges)], n=n
    )


def ref_reachable(graph: CSRGraph, live_eidx: np.ndarray, seeds) -> set[int]:
    """Reference reachability over an explicit set of live edge indices."""
    src = np.repeat(np.arange(graph.n), graph.out_degree())
    adj: dict[int, list[int]] = {}
    for e in live_eidx:
        adj.setdefault(int(src[e]), []).append(int(graph.out_dst[e]))
    seen = set(int(s) for s in seeds)
    stack = list(seen)
    while stack:
        u = stack.pop()
        for v in adj.get(u, ()):
            if v not in seen:
                seen.add(v)
                stack.append(v)
    return seen


def ref_simulate_ic(graph: CSRGraph, seeds, rng) -> int:
    """Reference naive IC simulation; returns |A_≤n|."""
    src = np.repeat(np.arange(graph.n), graph.out_degree())
    active = set(int(s) for s in seeds)
    frontier = list(active)
    while frontier:
        nxt = []
        for u in frontier:
            lo, hi = graph.out_indptr[u], graph.out_indptr[u + 1]
            for e in range(lo, hi):
                v = int(graph.out_dst[e])
                if rng.random() < graph.out_p[e] and v not in active:
                    active.add(v)
                    nxt.append(v)
        frontier = nxt
    return len(active)


def ref_rr_set(graph: CSRGraph, target: int, rng) -> set[int]:
    """Reference reverse simulation for one RR set."""
    visited = {int(target)}
    frontier = [int(target)]
    while frontier:
        nxt = []
        for v in frontier:
            lo, hi = graph.in_indptr[v], graph.in_indptr[v + 1]
            for e in range(lo, hi):
                u = int(graph.in_src[e])
                if rng.random() < graph.in_p[e] and u not in visited:
                    visited.add(u)
                    nxt.append(u)
        frontier = nxt
    return visited
