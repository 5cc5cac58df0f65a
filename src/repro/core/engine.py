"""RADS top level: SM-E split + region grouping + R-Meef (Figure 1).

``run_rads`` is the full system of the paper: it splits the start-vertex
candidates by border distance (Prop. 1), enumerates the far-from-border
ones with the single-machine algorithm per machine, region-groups the
rest, and runs the distributed R-Meef rounds over them. The union is
the answer; the metrics object carries the simulated communication and
memory costs.
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.emtrie import list_bytes, trie_bytes_spark
from repro.core.metrics import VERTEX_BYTES, RunMetrics
from repro.core.regions import assign_region_groups_spark
from repro.core.rmeef import run_rmeef
from repro.core.sme import sme_enumerate, split_candidates
from repro.graphs.datasets import GraphContext
from repro.query.pattern import Pattern
from repro.query.plan import Plan, choose_plan


def run_rads(
    gc: GraphContext,
    pattern: Pattern,
    query_name: str = "",
    plan: Plan | None = None,
    *,
    bytes_budget: int | None = None,
    group_mem_bytes: int | None = None,
    sequential_groups: bool = False,
    use_sme: bool = True,
    measure_compression: bool = False,
) -> tuple[DataFrame | None, RunMetrics]:
    """Enumerate ``pattern`` with RADS. Returns (embeddings, metrics);
    embeddings has one column per query vertex (u0..u{n-1}).

    * ``bytes_budget`` — simulated per-machine memory; exceeded ⇒ failed.
    * ``group_mem_bytes`` — Φ for region grouping (Alg. 3); None ⇒ one
      region group per machine.
    * ``use_sme=False`` disables Prop. 1 (everything distributed) — used
      by the ablation experiment.
    """
    t0 = time.perf_counter()
    metrics = RunMetrics("rads", query_name or pattern.name, gc.name)
    plan = plan or choose_plan(pattern)
    u_start = plan.units[0].piv

    c1, rest = split_candidates(gc, pattern, u_start)
    if not use_sme:
        rest = c1.unionByName(rest)
        c1 = c1.limit(0)
    c1 = c1.localCheckpoint()
    rest = rest.localCheckpoint()

    # --- SM-E per machine (Prop. 1 candidates) ---
    sme_df = sme_enumerate(gc, pattern, plan, c1).localCheckpoint()
    n_sme = sme_df.count()
    n_c1 = c1.count()
    metrics.extras["sme_embeddings"] = n_sme
    metrics.extras["c1_candidates"] = n_c1

    # --- region groups: Φ / (estimated rows per candidate, from SM-E) ---
    groups = None
    if group_mem_bytes is not None:
        est_rows = max(1.0, n_sme / max(1, n_c1))
        per_cand_bytes = est_rows * pattern.n * VERTEX_BYTES
        max_group = max(1, int(group_mem_bytes // per_cand_bytes))
        metrics.extras["max_group_size"] = max_group
        groups = assign_region_groups_spark(gc, rest, max_group).localCheckpoint()
        metrics.extras["n_region_groups"] = (
            groups.select("machine", "g").distinct().count()
        )

    # --- distributed phase ---
    dist_df = run_rmeef(
        gc, pattern, plan, rest, metrics,
        bytes_budget=bytes_budget,
        groups=groups,
        sequential_groups=sequential_groups,
        measure_compression=measure_compression,
    )
    if dist_df is None:
        metrics.elapsed_s = time.perf_counter() - t0
        return None, metrics

    cols = [f"u{u}" for u in range(pattern.n)]
    out = sme_df.select(*cols).unionByName(dist_df.select(*cols)).localCheckpoint()
    metrics.n_embeddings = out.count()
    metrics.extras["dist_embeddings"] = metrics.n_embeddings - n_sme
    if measure_compression:
        # include the final result set (SM-E + distributed) in the
        # EL-vs-ET comparison, stored in matching order like the trie
        mo_cols = [f"u{u}" for u in plan.matching_order]
        el = list_bytes(metrics.n_embeddings, pattern.n)
        et = trie_bytes_spark(out, mo_cols)
        metrics.extras["el_bytes"] = max(metrics.extras.get("el_bytes", 0), el)
        metrics.extras["et_bytes"] = max(metrics.extras.get("et_bytes", 0), et)
    metrics.elapsed_s = time.perf_counter() - t0
    return out, metrics
