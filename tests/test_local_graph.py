"""Tests for the driver-side LocalGraph substrate."""
import pandas as pd
import pytest

from repro.graph import gen
from repro.graph.coloring import sequential_greedy
from repro.graph.local import LocalGraph, h_index


def _lg(n=30, p=0.3, seed=0, p_a=0.5):
    v, e = gen.random_attributed_graph(n, p, seed=seed, p_a=p_a)
    return LocalGraph.from_pandas(v, e)


def _path(n):
    v = pd.DataFrame({"id": range(n), "attr": (["a", "b"] * (n // 2 + 1))[:n]})
    e = pd.DataFrame({"src": range(n - 1), "dst": range(1, n)})
    return LocalGraph.from_pandas(v, e)


def test_from_pandas_symmetry():
    lg = _lg()
    for u, nbrs in lg.adj.items():
        for v in nbrs:
            assert u in lg.adj[v]
            assert u != v


def test_n_m_counts():
    v, e = gen.random_attributed_graph(40, 0.2, seed=1)
    lg = LocalGraph.from_pandas(v, e)
    assert lg.n == 40
    assert lg.m == len(e)


def test_subgraph_induces_edges():
    lg = _lg(seed=2)
    keep = list(lg.adj)[:15]
    sub = lg.subgraph(keep)
    assert set(sub.adj) == set(keep)
    for u in keep:
        assert sub.adj[u] == lg.adj[u] & set(keep)


def test_is_clique():
    v = pd.DataFrame({"id": [0, 1, 2, 3], "attr": ["a", "b", "a", "b"]})
    e = pd.DataFrame({"src": [0, 0, 0, 1, 1, 2], "dst": [1, 2, 3, 2, 3, 3]})
    lg = LocalGraph.from_pandas(v, e)
    assert lg.is_clique([0, 1, 2, 3])
    e2 = e.iloc[:-1]
    lg2 = LocalGraph.from_pandas(v, e2)
    assert not lg2.is_clique([0, 1, 2, 3])
    assert lg2.is_clique([0, 1, 2])


def test_attr_counts_and_fairness():
    v = pd.DataFrame({"id": [0, 1, 2, 3], "attr": ["a", "b", "a", "b"]})
    e = pd.DataFrame({"src": [0, 0, 0, 1, 1, 2], "dst": [1, 2, 3, 2, 3, 3]})
    lg = LocalGraph.from_pandas(v, e)
    assert lg.attr_counts([0, 1, 2, 3]) == (2, 2)
    assert lg.is_fair_clique([0, 1, 2, 3], k=2, delta=0)
    assert not lg.is_fair_clique([0, 1, 2, 3], k=3, delta=0)
    assert not lg.is_fair_clique([0, 1, 2], k=1, delta=0)  # diff 1 > 0


def test_recolor_is_proper():
    lg = _lg(seed=3)
    lg.recolor()
    for u, nbrs in lg.adj.items():
        for v in nbrs:
            assert lg.color[u] != lg.color[v]


def test_recolor_matches_sequential_greedy():
    lg = _lg(seed=4)
    lg.recolor()
    assert lg.color == sequential_greedy(lg.adj)


def test_k_core_min_degree():
    lg = _lg(n=50, p=0.15, seed=5)
    core = lg.k_core(3)
    for v in core.adj:
        assert len(core.adj[v]) >= 3


def test_k_core_is_maximal_against_reference():
    """Peel one vertex at a time (reference) == batch k_core."""
    lg = _lg(n=40, p=0.2, seed=6)
    adj = {v: set(s) for v, s in lg.adj.items()}
    changed = True
    while changed:
        changed = False
        for v in list(adj):
            if len(adj[v]) < 3:
                for u in adj[v]:
                    adj[u].discard(v)
                del adj[v]
                changed = True
    assert set(lg.k_core(3).adj) == set(adj)


def test_k_core_of_clique():
    v = pd.DataFrame({"id": range(6), "attr": ["a"] * 6})
    pairs = [(i, j) for i in range(6) for j in range(i + 1, 6)]
    e = pd.DataFrame(pairs, columns=["src", "dst"])
    lg = LocalGraph.from_pandas(v, e)
    assert set(lg.k_core(5).adj) == set(range(6))
    assert lg.k_core(6).n == 0


def test_degeneracy_path_and_clique():
    assert _path(10).degeneracy() == 1
    v = pd.DataFrame({"id": range(5), "attr": ["a"] * 5})
    pairs = [(i, j) for i in range(5) for j in range(i + 1, 5)]
    lg = LocalGraph.from_pandas(v, pd.DataFrame(pairs, columns=["src", "dst"]))
    assert lg.degeneracy() == 4


def test_h_index_function():
    assert h_index([]) == 0
    assert h_index([0, 0]) == 0
    assert h_index([1, 1, 1]) == 1
    assert h_index([3, 3, 3]) == 3
    assert h_index([5, 4, 3, 2, 1]) == 3


def test_h_index_graph():
    lg = _path(10)
    assert lg.h_index() == 2


def test_empty_graph():
    lg = LocalGraph.from_pandas(
        pd.DataFrame({"id": [], "attr": []}),
        pd.DataFrame({"src": [], "dst": []}),
    )
    assert lg.n == 0 and lg.m == 0
    assert lg.degeneracy() == 0
    assert lg.k_core(1).n == 0
