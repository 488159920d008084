"""Fig. 6/7 as a table: MaxRFC vs MaxRFC+ub vs MaxRFC+ub+HeurRFC.

The baseline is the basic framework (size-only pruning, Lemma 5, no
heuristic); +ub adds the attribute-aware node pruning and the dataset's
best Table-II root bound; +ub+HeurRFC additionally seeds the incumbent
with the heuristic and searches the (|R*|−1)-core. Paper shape: the
pruned variants are dramatically faster (paper: ~15–20× on Flixster at
k=2); at our scale we report both wall time and search-tree nodes (the
scale-free pruning signal).

The baseline gets a 60 s budget; "INF" marks a timeout, as in the paper.
"""
import pytest

from repro.graph.gen import DATASETS, PARAM_GRID
from repro.bench_harness import emit_table, kernel, run_cell

BEST_UB = {  # per-dataset best combos (paper §VI-B: cp for three, cd otherwise)
    "themarker": "ad+cp", "google": "ad+cp", "pokec": "ad+cp",
    "dblp": "ad+cd", "flixster": "ad+cd", "aminer": "ad+cd",
}

VARIANTS = ("base", "ub", "ub+heur")
_ROWS: dict[tuple[str, str], tuple[float, int, int, bool]] = {}


@pytest.mark.parametrize("variant", VARIANTS)
@pytest.mark.parametrize("name", sorted(DATASETS))
def test_variant(benchmark, spark, name, variant):
    _, kdef, _, ddef = PARAM_GRID[name]
    kern = kernel(spark, name, kdef)
    kwargs = {
        "base": dict(combo="s", node_prune="basic", use_heuristic=False,
                     time_limit=60.0),
        "ub": dict(combo=BEST_UB[name], node_prune="attr", use_heuristic=False,
                   time_limit=60.0),
        "ub+heur": dict(combo=BEST_UB[name], node_prune="attr",
                        use_heuristic=True, time_limit=60.0),
    }[variant]
    combo = kwargs.pop("combo")

    def run():
        return run_cell(kern, kdef, ddef, combo, **kwargs)

    res, total = benchmark.pedantic(run, rounds=1, iterations=1)
    _ROWS[(name, variant)] = (total, res.size, res.search.nodes,
                              res.search.completed)


def test_variants_agree_and_prune(benchmark, spark):
    benchmark.pedantic(lambda: None, rounds=1, iterations=1)
    lines = ["### Fig. 6 (ours, as table) — MaxRFC variants at default k, δ "
             "(time ms / search nodes)", "",
             "| dataset | MaxRFC (basic) | +ub | +ub+HeurRFC | size |",
             "|---|---|---|---|---|"]
    for name in sorted(DATASETS):
        cells, sizes = [], set()
        for v in VARIANTS:
            t, size, nodes, done = _ROWS[(name, v)]
            cells.append(("INF" if not done else f"{t*1000:,.0f} ms") + f" / {nodes:,}")
            if done:
                sizes.add(size)
        best = max(sizes) if sizes else "?"
        lines.append(f"| {name} | " + " | ".join(cells) + f" | {best} |")
        assert len(sizes) <= 1  # every completed variant finds the optimum
        base_nodes = _ROWS[(name, "base")][2]
        heur_nodes = _ROWS[(name, "ub+heur")][2]
        assert heur_nodes <= base_nodes  # pruning never explores more
    emit_table("fig6_variants", lines)
