"""Shared harness for the evaluation-section benchmarks and jobs.

Caches per-(dataset, k) Spark reduction pipelines so the Table-II sweep
(6 datasets × 10 parameter points × 6 ub configs) pays each reduction
once — the reduction is identical work for every ub configuration, as
in the paper, where the configs differ only inside the branch-and-bound.

Cell times reported for Table II are ``reduce_seconds + heuristic +
search`` (the full MaxRFC pipeline for that configuration); the
reduction component is measured once and shared, so cross-config
differences reflect the search exactly — mirroring the paper's setup
where Table II differences across configs are fractions of a percent.
"""
from __future__ import annotations

import os
import time
from dataclasses import dataclass

from pyspark.sql import SparkSession

from repro.graph import gen
from repro.graph.builder import AttributedGraph, from_pandas
from repro.graph.coloring import color_graph_local
from repro.graph.local import LocalGraph
from repro.core.maxrfc import MaxRFCResult, max_rfc_local
from repro.core.reduction import ReductionReport, reduce_pipeline

#: Table-II ub configurations, in the paper's column order.
TABLE2_COMBOS = ("ad", "ad+deg", "ad+h", "ad+cd", "ad+ch", "ad+cp")


def bench_scale() -> float:
    """Benchmark dataset scale (override with BENCH_SCALE)."""
    return float(os.environ.get("BENCH_SCALE", "1.0"))


def max_peel_rounds() -> int:
    """Per-stage batch-peel round cap for benchmarks (BENCH_MAX_ROUNDS).

    Early-stopped peeling keeps a superset of the exact fixpoint — sound
    (see repro.core.reduction) — and bounds the latency of truss-style
    cascades that remove only a few edges per round. The cascade tail is
    normally finished exactly on the driver (``local_threshold``), so
    this cap only bounds the big-graph rounds.
    """
    return int(os.environ.get("BENCH_MAX_ROUNDS", "8"))


def local_threshold() -> int:
    """Edge count at which the peel tail moves to the driver
    (BENCH_LOCAL_THRESHOLD; see repro.core.reduction / local_peel)."""
    return int(os.environ.get("BENCH_LOCAL_THRESHOLD", "2000"))


@dataclass
class Prepared:
    """A dataset lifted to Spark with its (driver-computed) coloring."""

    name: str
    graph: AttributedGraph
    colors: object
    n: int
    m: int
    gen_seconds: float


@dataclass
class Kernel:
    """Reduced kernel for one (dataset, k): ready for driver-side search."""

    name: str
    k: int
    lg: LocalGraph
    report: ReductionReport
    reduce_seconds: float


_PREPARED: dict[tuple[str, float], Prepared] = {}
_KERNELS: dict[tuple[str, float, int], Kernel] = {}


def prepare(spark: SparkSession, name: str, scale: float | None = None) -> Prepared:
    scale = bench_scale() if scale is None else scale
    key = (name, scale)
    if key not in _PREPARED:
        t0 = time.perf_counter()
        v, e = gen.DATASETS[name](scale=scale)
        g = from_pandas(spark, v, e).checkpointed()
        colors = color_graph_local(g).localCheckpoint(eager=True)
        _PREPARED[key] = Prepared(
            name=name,
            graph=g,
            colors=colors,
            n=len(v),
            m=len(e),
            gen_seconds=time.perf_counter() - t0,
        )
    return _PREPARED[key]


def kernel(spark: SparkSession, name: str, k: int, scale: float | None = None) -> Kernel:
    scale = bench_scale() if scale is None else scale
    key = (name, scale, k)
    if key not in _KERNELS:
        prep = prepare(spark, name, scale)
        t0 = time.perf_counter()
        report = reduce_pipeline(
            prep.graph,
            k,
            colors=prep.colors,
            max_rounds=max_peel_rounds(),
            local_threshold=local_threshold(),
        )
        secs = time.perf_counter() - t0
        lg = LocalGraph.from_spark(report.graph, report.colors)
        _KERNELS[key] = Kernel(name=name, k=k, lg=lg, report=report, reduce_seconds=secs)
    return _KERNELS[key]


def run_cell(
    kern: Kernel,
    k: int,
    delta: int,
    combo: str,
    *,
    node_prune: str = "attr",
    use_heuristic: bool = True,
    time_limit: float | None = None,
) -> tuple[MaxRFCResult, float]:
    """One MaxRFC configuration on a prepared kernel.

    Returns (result, total_seconds) where total includes the shared
    reduction time plus this configuration's heuristic + search time.
    """
    t0 = time.perf_counter()
    res = max_rfc_local(
        kern.lg,
        k,
        delta,
        ub_combo=combo,
        node_prune=node_prune,
        use_heuristic=use_heuristic,
        time_limit=time_limit,
    )
    own = time.perf_counter() - t0
    return res, kern.reduce_seconds + own


def fmt_ms(seconds: float) -> str:
    return f"{seconds * 1000:,.1f}"


def emit_table(basename: str, lines: list[str]) -> None:
    """Print a markdown table and persist it under benchmarks/out/.

    ``pytest`` captures stdout of passing tests, so the durable copy in
    ``benchmarks/out/<basename>.md`` is what EXPERIMENTS.md is built
    from; the print still shows under ``-s``.
    """
    from pathlib import Path

    text = "\n".join(lines) + "\n"
    print("\n" + text)
    out = Path("benchmarks") / "out"
    if out.parent.is_dir():
        out.mkdir(exist_ok=True)
        (out / f"{basename}.md").write_text(text)
