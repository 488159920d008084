"""Exact brute-force baseline: the test oracle for maximum fair cliques.

Every maximum (k, δ)-fair clique is a subset of some maximal clique, and
inside a maximal clique with attribute counts (n_a, n_b) the largest
fair subset has a closed form (drop surplus vertices of the majority
attribute). So: enumerate all maximal cliques with Bron–Kerbosch (with
pivoting), apply the trim formula, keep the best witness.

Exponential in the worst case — used on small test graphs only, and as
the "enumerate everything" strawman the paper's intro argues against.
"""
from __future__ import annotations

from repro.graph.local import LocalGraph

ATTR_A = "a"


def best_fair_subclique_size(na: int, nb: int, k: int, delta: int) -> int:
    """Largest fair subset size within a clique of counts (na, nb); 0 if none."""
    if min(na, nb) < k:
        return 0
    if abs(na - nb) <= delta:
        return na + nb
    return 2 * min(na, nb) + delta


def _maximal_cliques(adj: dict[int, set[int]]):
    """Bron–Kerbosch with pivoting; yields each maximal clique as a set."""
    def bk(r: set[int], p: set[int], x: set[int]):
        if not p and not x:
            yield set(r)
            return
        pivot = max(p | x, key=lambda u: len(adj[u] & p))
        for v in list(p - adj[pivot]):
            yield from bk(r | {v}, p & adj[v], x & adj[v])
            p.discard(v)
            x.add(v)

    yield from bk(set(), set(adj), set())


def brute_force_max_fair_clique(
    lg: LocalGraph, k: int, delta: int
) -> list[int]:
    """Exact maximum (k, δ)-fair clique (a witness list; [] if none)."""
    best: list[int] = []
    for mc in _maximal_cliques(lg.adj):
        a_side = [v for v in mc if lg.attr[v] == ATTR_A]
        b_side = [v for v in mc if lg.attr[v] != ATTR_A]
        size = best_fair_subclique_size(len(a_side), len(b_side), k, delta)
        if size > len(best):
            # Trim the majority side down to the allowed count.
            na = len(a_side)
            nb = len(b_side)
            if abs(na - nb) <= delta:
                keep_a, keep_b = na, nb
            elif na > nb:
                keep_a, keep_b = nb + delta, nb
            else:
                keep_a, keep_b = na, na + delta
            best = sorted(a_side)[:keep_a] + sorted(b_side)[:keep_b]
    return best


def brute_force_size(lg: LocalGraph, k: int, delta: int) -> int:
    return len(brute_force_max_fair_clique(lg, k, delta))
