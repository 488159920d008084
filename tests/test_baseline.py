"""Tests for the brute-force exact baseline (itself the oracle elsewhere)."""
import itertools

import pandas as pd
import pytest

from repro.graph import gen
from repro.graph.local import LocalGraph
from repro.core.baseline import (
    best_fair_subclique_size,
    brute_force_max_fair_clique,
    brute_force_size,
)


def _lg(n, p, seed, p_a=0.5):
    v, e = gen.random_attributed_graph(n, p, seed=seed, p_a=p_a)
    return LocalGraph.from_pandas(v, e)


def _exhaustive_max_fair(lg, k, delta):
    """Ground truth by direct subset enumeration (tiny graphs only)."""
    verts = list(lg.adj)
    best = 0
    for r in range(len(verts), 2 * k - 1, -1):
        for sub in itertools.combinations(verts, r):
            if lg.is_fair_clique(sub, k, delta):
                return r
    return best


@pytest.mark.parametrize("na,nb,k,delta,expect", [
    (3, 3, 3, 0, 6),
    (5, 3, 3, 1, 7),     # paper Example 1 shape: trim one majority vertex
    (5, 3, 3, 2, 8),
    (2, 5, 3, 1, 0),     # min side below k
    (3, 3, 3, 5, 6),
    (10, 3, 3, 0, 6),
    (10, 3, 3, 4, 10),
    (0, 0, 1, 1, 0),
])
def test_best_fair_subclique_size(na, nb, k, delta, expect):
    assert best_fair_subclique_size(na, nb, k, delta) == expect


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("k,delta", [(1, 0), (1, 1), (2, 1), (2, 2)])
def test_brute_force_matches_exhaustive(seed, k, delta):
    lg = _lg(10, 0.5, seed)
    assert brute_force_size(lg, k, delta) == _exhaustive_max_fair(lg, k, delta)


@pytest.mark.parametrize("seed", range(6))
def test_brute_force_witness_is_fair(seed):
    lg = _lg(25, 0.4, seed)
    for k, delta in [(1, 1), (2, 1), (2, 2), (3, 2)]:
        w = brute_force_max_fair_clique(lg, k, delta)
        if w:
            assert lg.is_fair_clique(w, k, delta)
            assert len(w) >= 2 * k


def test_brute_force_on_planted_clique():
    v, e = gen.random_attributed_graph(30, 0.1, seed=3)
    edges = set(zip(e["src"], e["dst"]))
    import numpy as np
    members = np.arange(8)
    gen.plant_fair_clique(edges, v, members, cnt_a=4, seed=1)
    lg = LocalGraph.from_pandas(v, gen._edges_frame(edges))
    assert brute_force_size(lg, 4, 0) >= 8


def test_brute_force_trim_majority():
    """A 5a+3b clique with k=3, δ=1 must be trimmed to 7 (paper Example 1)."""
    v = pd.DataFrame({"id": range(8), "attr": ["a"] * 5 + ["b"] * 3})
    pairs = [(i, j) for i in range(8) for j in range(i + 1, 8)]
    lg = LocalGraph.from_pandas(v, pd.DataFrame(pairs, columns=["src", "dst"]))
    w = brute_force_max_fair_clique(lg, 3, 1)
    assert len(w) == 7
    assert lg.is_fair_clique(w, 3, 1)


def test_brute_force_no_fair_clique():
    v = pd.DataFrame({"id": range(4), "attr": ["a"] * 4})
    pairs = [(i, j) for i in range(4) for j in range(i + 1, 4)]
    lg = LocalGraph.from_pandas(v, pd.DataFrame(pairs, columns=["src", "dst"]))
    assert brute_force_max_fair_clique(lg, 1, 1) == []
