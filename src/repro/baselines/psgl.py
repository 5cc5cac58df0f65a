"""PSgL baseline (Shao et al., SIGMOD 2014).

Pregel-style graph exploration: query vertices are matched one at a
time in breadth-first order; after every superstep ALL partial
embeddings are messages re-shuffled to the machine owning the next
expansion anchor. No compression, no locality, no memory control —
exactly the properties the paper contrasts RADS against (Related Work
items (1)–(3)).
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.baselines.common import (
    attach_vertex,
    bfs_vertex_order,
    check_budget,
    shuffle_bytes,
)
from repro.core.metrics import RunMetrics
from repro.graphs.datasets import GraphContext
from repro.query.pattern import Pattern


def run_psgl(
    gc: GraphContext,
    pattern: Pattern,
    query_name: str = "",
    *,
    bytes_budget: int | None = None,
) -> tuple[DataFrame | None, RunMetrics]:
    """Enumerate ``pattern`` PSgL-style. Returns (embeddings, metrics)."""
    t0 = time.perf_counter()
    metrics = RunMetrics("psgl", query_name or pattern.name, gc.name)
    order = bfs_vertex_order(pattern)
    u0 = order[0]
    R = (
        gc.degrees.filter(F.col("deg") >= pattern.degree(u0))
        .select(F.col("v").alias(f"u{u0}"))
        .localCheckpoint()
    )
    rows = R.count()
    matched = [u0]
    metrics.rounds = pattern.n - 1
    for u in order[1:]:
        # superstep barrier: every partial embedding is re-shuffled
        metrics.add_comm("shuffle", shuffle_bytes(rows, len(matched), gc.n_machines))
        anchor = next(w for w in order if w in matched and w in pattern.adj[u])
        R = attach_vertex(gc, R, pattern, matched, u, anchor).localCheckpoint()
        matched.append(u)
        rows = R.count()
        if check_budget(metrics, rows, len(matched), bytes_budget, f"expand {u}", gc.n_machines):
            metrics.elapsed_s = time.perf_counter() - t0
            return None, metrics
    out = R.select(*[f"u{u}" for u in range(pattern.n)])
    metrics.n_embeddings = rows
    metrics.elapsed_s = time.perf_counter() - t0
    return out, metrics
