"""Spark reduction tests: fixpoint laws, batch≡sequential, optimum safety."""
import pandas as pd
import pytest

from repro.graph import gen
from repro.graph.builder import from_pandas
from repro.graph.coloring import color_graph_local
from repro.graph.local import LocalGraph
from repro.core import reference as ref
from repro.core.baseline import brute_force_size
from repro.core.reduction import (
    colorful_core,
    colorful_sup_reduce,
    en_colorful_core,
    reduce_pipeline,
)


@pytest.fixture(scope="module")
def dense_graph(spark):
    """Random graph + a planted fair clique so reductions keep something."""
    v, e = gen.random_attributed_graph(60, 0.15, seed=8)
    edges = set(zip(e["src"], e["dst"]))
    import numpy as np

    gen.plant_fair_clique(edges, v, np.arange(10), cnt_a=5, seed=4)
    e = gen._edges_frame(edges)
    g = from_pandas(spark, v, e).checkpointed()
    colors = color_graph_local(g).localCheckpoint(eager=True)
    lg = LocalGraph.from_pandas(v, e, colors.toPandas())
    return g, colors, v, e, lg


def _edge_set(g):
    ep = g.edges.toPandas()
    return set(zip(ep["src"].astype(int), ep["dst"].astype(int)))


@pytest.mark.parametrize("t", [2, 3, 4])
def test_en_colorful_core_equals_sequential_reference(dense_graph, t):
    g, colors, v, e, lg = dense_graph
    got = set(en_colorful_core(g, colors, t).vertices.toPandas()["id"])
    want = ref.reference_core_peel(lg, t, enhanced=True)
    assert got == want


@pytest.mark.parametrize("t", [2, 4])
def test_colorful_core_equals_sequential_reference(dense_graph, t):
    g, colors, v, e, lg = dense_graph
    got = set(colorful_core(g, colors, t).vertices.toPandas()["id"])
    want = ref.reference_core_peel(lg, t, enhanced=False)
    assert got == want


def test_encore_subset_of_core(dense_graph):
    """ED(u) ≤ D_min(u), so the enhanced core is contained in the core."""
    g, colors, *_ = dense_graph
    core = set(colorful_core(g, colors, 3).vertices.toPandas()["id"])
    encore = set(en_colorful_core(g, colors, 3).vertices.toPandas()["id"])
    assert encore <= core


@pytest.mark.parametrize("k,enhanced", [(3, False), (3, True), (4, False), (4, True)])
def test_sup_peel_equals_sequential_reference(dense_graph, k, enhanced):
    """Distributed batch edge-peel == one-at-a-time reference peel."""
    g, colors, v, e, lg = dense_graph
    got = _edge_set(colorful_sup_reduce(g, colors, k, enhanced=enhanced))
    want = ref.reference_sup_peel(lg, k, enhanced=enhanced)
    assert got == want


def test_sup_fixpoint_satisfies_lemma_conditions(dense_graph):
    """Every surviving edge meets its Lemma-3 thresholds (recomputed
    independently on the reduced edge set)."""
    g, colors, v, e, lg = dense_graph
    k = 4
    edges = _edge_set(colorful_sup_reduce(g, colors, k))
    for (u, w) in edges:
        c_a, c_b, c_m = ref.edge_groups(lg, edges, u, w)
        ka, kb = ref.thresholds(lg, u, w, k)
        assert c_a + c_m >= ka and c_b + c_m >= kb


def test_ensup_subset_of_sup(dense_graph):
    g, colors, *_ = dense_graph
    sup = _edge_set(colorful_sup_reduce(g, colors, 4, enhanced=False))
    ensup = _edge_set(colorful_sup_reduce(g, colors, 4, enhanced=True))
    assert ensup <= sup


@pytest.mark.parametrize("k,delta", [(3, 1), (4, 2)])
def test_reduction_preserves_optimum(dense_graph, k, delta):
    """The central safety property (Lemmas 1–4): the reduced graph holds a
    maximum fair clique of the original."""
    g, colors, v, e, lg = dense_graph
    opt = brute_force_size(lg, k, delta)
    rep = reduce_pipeline(g, k, colors=colors)
    red = LocalGraph.from_spark(rep.graph, rep.colors)
    assert brute_force_size(red, k, delta) == opt


def test_pipeline_monotone_shrink(dense_graph):
    g, colors, *_ = dense_graph
    rep = reduce_pipeline(g, 4, colors=colors)
    sizes = [(n, m) for _, n, m, _ in rep.stages]
    for (n1, m1), (n2, m2) in zip(sizes, sizes[1:]):
        assert n2 <= n1 and m2 <= m1
    assert [s[0] for s in rep.stages] == ["original", "encore", "sup", "ensup"]


def test_pipeline_rejects_unknown_stage(dense_graph):
    g, colors, *_ = dense_graph
    with pytest.raises(ValueError):
        reduce_pipeline(g, 3, stages=("bogus",), colors=colors)


def test_paper_example2_shape(spark):
    """Example 2 analogue: an edge whose common-neighbor colorful support
    on one attribute is below k−1 is removed by ColorfulSup."""
    # Edge (0,1), attrs a/b; common neighbors: 2,3 (attr a), 4 (attr b).
    # With k=3 thresholds (k−1, k−1) = (2, 2): sup_b = 1 < 2 → edge dies.
    v = pd.DataFrame(
        {"id": [0, 1, 2, 3, 4], "attr": ["a", "b", "a", "a", "b"]}
    )
    e = pd.DataFrame(
        {"src": [0, 0, 0, 1, 1, 1], "dst": [1, 2, 3, 2, 3, 4]}
    ).assign(dst=lambda d: d["dst"])
    e = pd.concat(
        [e, pd.DataFrame({"src": [0], "dst": [4]})], ignore_index=True
    )
    g = from_pandas(spark, v, e)
    colors = color_graph_local(g)
    red = colorful_sup_reduce(g, colors, 3)
    assert (0, 1) not in _edge_set(red)
