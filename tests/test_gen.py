"""Tests for the synthetic attributed-graph generators (driver-only)."""
import numpy as np
import pandas as pd
import pytest

from repro.graph import gen
from repro.graph.local import LocalGraph


@pytest.mark.parametrize("name", sorted(gen.DATASETS))
def test_dataset_shapes(name):
    v, e = gen.DATASETS[name](scale=0.2)
    assert set(v.columns) == {"id", "attr"}
    assert set(e.columns) == {"src", "dst"}
    assert len(v) > 0 and len(e) > 0
    assert set(v["attr"]) <= {"a", "b"}


@pytest.mark.parametrize("name", sorted(gen.DATASETS))
def test_dataset_deterministic(name):
    v1, e1 = gen.DATASETS[name](scale=0.2)
    v2, e2 = gen.DATASETS[name](scale=0.2)
    pd.testing.assert_frame_equal(v1, v2)
    pd.testing.assert_frame_equal(e1, e2)


@pytest.mark.parametrize("name", sorted(gen.DATASETS))
def test_edges_canonical(name):
    _, e = gen.DATASETS[name](scale=0.2)
    assert (e["src"] < e["dst"]).all()
    assert not e.duplicated(["src", "dst"]).any()


@pytest.mark.parametrize("name", sorted(gen.DATASETS))
def test_both_attributes_present(name):
    v, _ = gen.DATASETS[name](scale=0.2)
    counts = v["attr"].value_counts()
    assert counts.get("a", 0) > 0 and counts.get("b", 0) > 0


def test_attr_balance_uniform():
    v, _ = gen.DATASETS["pokec"](scale=1.0)
    frac_a = (v["attr"] == "a").mean()
    assert 0.40 <= frac_a <= 0.60


def test_attr_balance_skewed_aminer():
    v, _ = gen.DATASETS["aminer"](scale=1.0)
    frac_a = (v["attr"] == "a").mean()
    assert frac_a < 0.52  # skewed toward b


def test_gnp_edge_count_reasonable():
    edges = gen.gnp(60, 0.5, seed=3)
    total = 60 * 59 // 2
    assert 0.35 * total <= len(edges) <= 0.65 * total


def test_gnp_zero_p():
    assert gen.gnp(30, 0.0, seed=1) == set()


def test_powerlaw_heavy_tail():
    edges = gen.powerlaw(400, 3, seed=7)
    lg = LocalGraph.from_pandas(
        pd.DataFrame({"id": range(400), "attr": ["a"] * 400}),
        gen._edges_frame(edges),
    )
    degs = sorted((lg.degree(v) for v in lg.adj), reverse=True)
    assert degs[0] >= 4 * np.median(degs)  # hub-dominated


def test_affiliation_contains_triangles():
    edges = gen.affiliation(120, 20, 4, 8, seed=5)
    adj = {}
    for u, v in edges:
        adj.setdefault(u, set()).add(v)
        adj.setdefault(v, set()).add(u)
    tri = sum(
        1
        for u, v in edges
        for w in adj[u] & adj[v]
    )
    assert tri > 50


def test_plant_fair_clique_pins_attrs_and_edges():
    v, e = gen.random_attributed_graph(40, 0.05, seed=9)
    edges = set(zip(e["src"], e["dst"]))
    members = np.array([0, 3, 7, 11, 20, 33])
    gen.plant_fair_clique(edges, v, members, cnt_a=3, seed=2)
    e2 = gen._edges_frame(edges)
    lg = LocalGraph.from_pandas(v, e2)
    assert lg.is_clique(members.tolist())
    na, nb = lg.attr_counts(members.tolist())
    assert (na, nb) == (3, 3)


@pytest.mark.parametrize("name", sorted(gen.DATASETS))
def test_planted_cliques_survive(name):
    """Each dataset plants fair cliques; the largest planted size must be
    realizable as an actual clique in the final graph."""
    v, e = gen.DATASETS[name](scale=1.0)
    lg = LocalGraph.from_pandas(v, e)
    # The graph must contain at least one vertex whose degree can host the
    # largest planted clique (necessary condition, cheap to check).
    biggest = {"themarker": 16, "google": 22, "dblp": 22, "flixster": 15,
               "pokec": 18, "aminer": 18}[name]
    assert max(lg.degree(u) for u in lg.adj) >= biggest - 1


def test_scale_changes_size():
    v1, e1 = gen.DATASETS["dblp"](scale=0.2)
    v2, e2 = gen.DATASETS["dblp"](scale=1.0)
    assert len(v2) > len(v1)
    assert len(e2) > len(e1)


def test_random_attributed_graph_deterministic():
    a = gen.random_attributed_graph(30, 0.2, seed=4)
    b = gen.random_attributed_graph(30, 0.2, seed=4)
    pd.testing.assert_frame_equal(a[0], b[0])
    pd.testing.assert_frame_equal(a[1], b[1])
