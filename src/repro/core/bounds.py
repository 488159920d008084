"""Upper bounds on MRFC(R, C) — the max fair-clique size in a branch.

Implements the paper's full bound family (Lemmas 5–14). Each bound takes
the induced ``LocalGraph`` of R ∪ C (recolored locally, as the paper
recolors G' per branch) and returns an integer upper bound on the size
of any (k, δ)-fair clique inside it.

Soundness adjustments vs. the printed lemmas (DESIGN.md §3.3):

- Lemma 9's printed formula can undercut valid cliques; we use the
  derivation the text describes (assign mixed color groups to the scarce
  attribute): ``T`` if balanceable within δ else ``2·(min+c_m)+δ``.
- Degeneracy/h-index bound |K|−1, not |K|, so Lemmas 10–13 get a ``+1``
  (``△+1``, ``h+1``, ``2·(ccore_max+1)+δ``, ``2·(h̄+1)+δ``), each capped
  by |V(G')|. Validity of every bound is tested against brute force.
"""
from __future__ import annotations

from repro.graph.local import LocalGraph, h_index
from repro.core.order import colorful_dmin_per_vertex, colorful_peel

ATTR_A = "a"
ATTR_B = "b"

#: Table-II bound configurations: ub_AD = min(ub_s, ub_a, ub_c, ub_ac,
#: ub_eac); the rest add one advanced bound on top.
COMBOS = ("s", "ad", "ad+deg", "ad+h", "ad+cd", "ad+ch", "ad+cp")


def _fair_pair(x: int, y: int, delta: int) -> int:
    """max total of a (≥0) pair capped at counts (x, y) with |diff| ≤ δ."""
    if abs(x - y) <= delta:
        return x + y
    return 2 * min(x, y) + delta


def _color_groups(sub: LocalGraph) -> tuple[int, int, int]:
    """(c_a, c_b, c_m): colors exclusive to a, to b, and mixed."""
    sub.ensure_colors()
    attrs_by_color: dict[int, set[str]] = {}
    for v in sub.adj:
        attrs_by_color.setdefault(sub.color[v], set()).add(sub.attr[v])
    c_a = sum(1 for s in attrs_by_color.values() if s == {ATTR_A})
    c_b = sum(1 for s in attrs_by_color.values() if s == {ATTR_B})
    c_m = sum(1 for s in attrs_by_color.values() if len(s) == 2)
    return c_a, c_b, c_m


# -- Lemma 5–9: the "advanced" group ub_AD -----------------------------

def ub_size(sub: LocalGraph) -> int:
    """Lemma 5: |R| + |C|."""
    return sub.n


def ub_attr(sub: LocalGraph, delta: int) -> int:
    """Lemma 6: attribute counts with the δ balance cap."""
    na, nb = sub.attr_counts(sub.adj)
    return _fair_pair(na, nb, delta)


def ub_color(sub: LocalGraph) -> int:
    """Lemma 7: number of colors of a greedy coloring of G'."""
    sub.ensure_colors()
    return len(set(sub.color[v] for v in sub.adj))


def ub_attr_color(sub: LocalGraph, delta: int) -> int:
    """Lemma 8: per-attribute color counts with the δ balance cap."""
    sub.ensure_colors()
    cols_a = {sub.color[v] for v in sub.adj if sub.attr[v] == ATTR_A}
    cols_b = {sub.color[v] for v in sub.adj if sub.attr[v] == ATTR_B}
    return _fair_pair(len(cols_a), len(cols_b), delta)


def ub_en_attr_color(sub: LocalGraph, delta: int) -> int:
    """Lemma 9 (corrected form): exclusive/mixed color-group bound."""
    c_a, c_b, c_m = _color_groups(sub)
    lo, hi = min(c_a, c_b), max(c_a, c_b)
    if lo + c_m >= hi - delta:
        return c_a + c_b + c_m
    return 2 * (lo + c_m) + delta


def ub_advanced(sub: LocalGraph, delta: int) -> int:
    """ub_AD: min of the five cheap bounds (paper §VI-A grouping)."""
    return min(
        ub_size(sub),
        ub_attr(sub, delta),
        ub_color(sub),
        ub_attr_color(sub, delta),
        ub_en_attr_color(sub, delta),
    )


# -- Lemmas 10–11: classic structural bounds ---------------------------

def ub_degeneracy(sub: LocalGraph) -> int:
    """Lemma 10 (sound form): clique size ≤ degeneracy + 1."""
    return min(sub.n, sub.degeneracy() + 1)


def ub_h_index(sub: LocalGraph) -> int:
    """Lemma 11 (sound form): clique size ≤ h-index + 1."""
    return min(sub.n, sub.h_index() + 1)


# -- Lemmas 12–14: colorful structural bounds --------------------------

def ub_colorful_degeneracy(sub: LocalGraph, delta: int) -> int:
    """Lemma 12 (sound form).

    Every vertex of a fair clique with counts (x_a, x_b) has colorful
    core number ≥ min(x_a, x_b) − 1, so
    size ≤ 2·(colorful degeneracy + 1) + δ.
    """
    _, _, cdeg = colorful_peel(sub)
    return min(sub.n, 2 * (cdeg + 1) + delta)


def ub_colorful_h(sub: LocalGraph, delta: int) -> int:
    """Lemma 13 (sound form): size ≤ 2·(colorful h-index + 1) + δ."""
    dmins = list(colorful_dmin_per_vertex(sub).values())
    return min(sub.n, 2 * (h_index(dmins) + 1) + delta)


def ub_colorful_path(sub: LocalGraph) -> int:
    """Lemma 14 / Algorithm 4: longest colorful path in the color DAG.

    Edges are oriented low→high by (color, id); proper coloring makes
    every directed path strictly color-increasing, hence colorful, and
    every clique is such a path. DP over the topological (color, id)
    order gives the longest one in O(V + E).
    """
    sub.ensure_colors()
    if not sub.adj:
        return 0
    verts = sorted(sub.adj, key=lambda v: (sub.color[v], v))
    f = {v: 1 for v in verts}
    best = 1
    for v in verts:  # topological order of the DAG
        kv = (sub.color[v], v)
        for u in sub.adj[v]:
            if (sub.color[u], u) < kv:  # edge u -> v
                if f[u] + 1 > f[v]:
                    f[v] = f[u] + 1
        best = max(best, f[v])
    return best


def compute_ub(sub: LocalGraph, delta: int, combo: str) -> int:
    """Evaluate a Table-II bound configuration on the branch subgraph."""
    if combo == "s":
        return ub_size(sub)
    base = ub_advanced(sub, delta)
    if combo == "ad":
        return base
    extra = combo.split("+", 1)[1]
    if extra == "deg":
        return min(base, ub_degeneracy(sub))
    if extra == "h":
        return min(base, ub_h_index(sub))
    if extra == "cd":
        return min(base, ub_colorful_degeneracy(sub, delta))
    if extra == "ch":
        return min(base, ub_colorful_h(sub, delta))
    if extra == "cp":
        return min(base, ub_colorful_path(sub))
    raise ValueError(f"unknown bound combo: {combo}")
