"""R-Meef: region-grouped multi-round expand / verify & filter (Sec. 3.2).

The distributed rounds as a Catalyst dataflow. Each embedding row
carries its *home machine* ``m`` (owner of the start vertex) and region
group ``g``. Per unit of the execution plan:

Expand   — join on the pivot's adjacency, one leaf at a time, applying
           degree / injectivity / symmetry-breaking filters and the
           *locally-verifiable* verification edges immediately. Edges
           whose existence machine ``m`` cannot see (neither endpoint
           owned nor cached — Definition 4's undetermined edges) pass
           through with a pending flag: the resulting set is exactly
           the EC set of Definition 3.
Verify & Filter — distinct pending (m, v, v') pairs are the verifyE
           requests (the EVI dedupes shared undetermined edges, hence
           *distinct*); failed ECs are filtered.

Communication metering (DESIGN.md §2): fetchV = adjacency bytes of
newly-fetched foreign pivots (a cache DataFrame persists across rounds,
as in the paper); verifyE = 17 bytes per distinct pair. Intermediate
results never shuffle between machines — rows keep their home ``m``
for their whole life, which is the paper's core claim.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.emtrie import list_bytes, trie_bytes_spark
from repro.core.metrics import (
    TRIE_NODE_BYTES,
    VERIFY_PAIR_BYTES,
    VERTEX_BYTES,
    RunMetrics,
)
from repro.graphs.datasets import GraphContext
from repro.query.pattern import Pattern
from repro.query.plan import Plan


def _c(u: int) -> str:
    return f"u{u}"


def _o(u: int) -> str:
    return f"__o_{u}"


class _Budget(Exception):
    """Raised when an intermediate exceeds the simulated memory budget."""


def run_rmeef(
    gc: GraphContext,
    pattern: Pattern,
    plan: Plan,
    start_candidates: DataFrame,
    metrics: RunMetrics,
    *,
    bytes_budget: int | None = None,
    groups: DataFrame | None = None,
    sequential_groups: bool = False,
    measure_compression: bool = False,
) -> DataFrame | None:
    """Run the distributed phase; returns the embedding DataFrame
    (columns u0..u{n-1}) or None when the budget was exceeded
    (``metrics.failed`` is set). ``start_candidates``: (machine, v) of
    dp0.piv candidates assigned to the distributed phase; ``groups``:
    optional (machine, v, g) region-group assignment."""
    u0 = plan.units[0].piv
    base = start_candidates.select(
        F.col("machine").alias("m"), F.col("v").alias(_c(u0))
    )
    if groups is not None:
        base = base.join(
            groups.select(
                F.col("machine").alias("m"), F.col("v").alias(_c(u0)), "g"
            ),
            ["m", _c(u0)],
        )
    else:
        base = base.withColumn("g", F.lit(0))
    base = base.withColumn(_o(u0), F.col("m")).localCheckpoint()

    metrics.rounds = plan.rounds
    try:
        gids = (
            [r["g"] for r in base.select("g").distinct().collect()]
            if sequential_groups and groups is not None
            else []
        )
        if gids:
            parts = []
            for gid in sorted(gids):
                parts.append(
                    _run_rounds(
                        gc, pattern, plan, base.filter(F.col("g") == gid),
                        metrics, bytes_budget, measure_compression,
                    )
                )
            out = parts[0]
            for p in parts[1:]:
                out = out.unionByName(p)
        else:
            out = _run_rounds(
                gc, pattern, plan, base, metrics, bytes_budget,
                measure_compression,
            )
    except _Budget as e:
        metrics.failed = True
        metrics.fail_reason = str(e)
        return None
    cols = [_c(u) for u in range(pattern.n)]
    return out.select(*cols)


def _run_rounds(
    gc: GraphContext,
    pattern: Pattern,
    plan: Plan,
    R: DataFrame,
    metrics: RunMetrics,
    bytes_budget: int | None,
    measure_compression: bool,
) -> DataFrame:
    spark = gc.spark
    cache = spark.createDataFrame([], "m int, v long")  # fetched foreign vertices
    mo_pos = {u: i for i, u in enumerate(plan.matching_order)}
    matched: list[int] = [plan.units[0].piv]

    for i in range(plan.rounds):
        unit = plan.units[i]
        p = unit.piv

        # ---- fetchV: adjacency of foreign pivots, dedup via cache ----
        if i > 0:
            needed = (
                R.select("m", F.col(_c(p)).alias("v"))
                .distinct()
                .join(F.broadcast(gc.owner), "v")
                .filter(F.col("machine") != F.col("m"))
                .select("m", "v")
            )
            new = needed.join(F.broadcast(cache), ["m", "v"], "left_anti").localCheckpoint()
            agg = new.join(F.broadcast(gc.degrees), "v").agg(
                F.count("*").alias("n"), F.coalesce(F.sum("deg"), F.lit(0)).alias("d")
            ).collect()[0]
            if agg["n"]:
                metrics.add_comm(
                    "fetchV", (int(agg["d"]) + 2 * int(agg["n"])) * VERTEX_BYTES
                )
                cache = cache.unionByName(new).localCheckpoint()

        # ---- expand: one leaf at a time ----
        pending: list[tuple[int, int]] = []
        for u in plan.leaf_order(i):
            cu = _c(u)
            e = gc.edges.select(F.col("src").alias(_c(p)), F.col("dst").alias(cu))
            R = R.join(e, _c(p))
            # degree filter (candidate pruning, TurboIso-style)
            R = (
                R.join(
                    F.broadcast(
                        gc.degrees.select(F.col("v").alias(cu), F.col("deg").alias("__dg"))
                    ),
                    cu,
                )
                .filter(F.col("__dg") >= pattern.degree(u))
                .drop("__dg")
            )
            for x in matched:  # injectivity
                R = R.filter(F.col(cu) != F.col(_c(x)))
            for a, b in pattern.symmetry_breaking_pairs:  # preserved order
                if u in (a, b) and (a if b == u else b) in matched:
                    R = R.filter(F.col(_c(a)) < F.col(_c(b)))
            R = R.join(  # ownership of the new vertex (replicated map)
                F.broadcast(
                    gc.owner.select(F.col("v").alias(cu), F.col("machine").alias(_o(u)))
                ),
                cu,
            )
            # verification edges incident to u with an earlier endpoint
            for x, _ in plan.verification_edges_for_leaf(i, u):
                cx = _c(x)
                ex, ud = f"__ex_{x}_{u}", f"__ud_{x}_{u}"
                ee = gc.edges.select(
                    F.col("src").alias("__va"),
                    F.col("dst").alias("__vb"),
                    F.lit(True).alias(ex),
                )
                R = (
                    R.join(
                        ee,
                        (F.col(cx) == F.col("__va")) & (F.col(cu) == F.col("__vb")),
                        "left",
                    )
                    .drop("__va", "__vb")
                    .withColumn(ex, F.coalesce(F.col(ex), F.lit(False)))
                )
                # locally verifiable at m: an endpoint owned by m or cached at m
                local = (F.col(_o(x)) == F.col("m")) | (F.col(_o(u)) == F.col("m"))
                if i > 0:  # the fetch cache is empty before round 1
                    R = _with_cached_flag(R, cache, cx, "__cx")
                    R = _with_cached_flag(R, cache, cu, "__cu")
                    local = local | F.col("__cx") | F.col("__cu")
                R = R.withColumn(ud, ~local)
                if i > 0:
                    R = R.drop("__cx", "__cu")
                # locally-failed ECs never materialize (Algorithm 2 line 10)
                R = R.filter(F.col(ex) | F.col(ud))
                pending.append((x, u))
            matched.append(u)

        # ---- materialize the EC set of P_i ----
        R = R.localCheckpoint()
        # one aggregate job: total EC rows + per-(machine, group) peak
        # (memory is a per-machine, per-region-group quantity), the EVI
        # verifyE volume per pending edge (distinct undetermined pairs),
        # and the per-group embedding-trie size (distinct prefixes in
        # matching order) — what a machine actually holds in memory
        matched_set = set(matched)
        cols_mo = [_c(u) for u in plan.matching_order if u in matched_set]
        aggs = [F.count(F.lit(1)).alias("__n")]
        for x, u in pending:
            aggs.append(
                F.count_distinct(
                    F.when(
                        F.col(f"__ud_{x}_{u}"),
                        F.struct(F.col("m"), F.col(_c(x)), F.col(_c(u))),
                    )
                ).alias(f"__p_{x}_{u}")
            )
        for j in range(len(cols_mo)):
            aggs.append(
                F.count_distinct(
                    F.struct(*[F.col(c) for c in cols_mo[: j + 1]])
                ).alias(f"__t{j}")
            )
        grouped = R.groupBy("m", "g").agg(*aggs).collect()
        ec_rows = sum(r["__n"] for r in grouped)
        peak_trie_bytes = max(
            (
                sum(r[f"__t{j}"] for j in range(len(cols_mo))) * TRIE_NODE_BYTES
                for r in grouped
            ),
            default=0,
        )
        metrics.see_intermediate(ec_rows, len(matched))
        metrics.extras["peak_group_trie_bytes"] = max(
            metrics.extras.get("peak_group_trie_bytes", 0), peak_trie_bytes
        )
        if measure_compression:
            cols_mo = [_c(u) for u in plan.matching_order if u in set(matched)]
            el = list_bytes(ec_rows, len(matched))
            et = trie_bytes_spark(R, cols_mo)
            metrics.extras["el_bytes"] = max(metrics.extras.get("el_bytes", 0), el)
            metrics.extras["et_bytes"] = max(metrics.extras.get("et_bytes", 0), et)
        # RADS stores intermediates in the embedding trie (Sec. 5), so
        # the per-machine memory check compares the *trie* size of the
        # group's EC set against the budget — this is what lets RADS
        # survive hub-heavy rounds that would OOM as flat lists
        if bytes_budget is not None and peak_trie_bytes > bytes_budget:
            raise _Budget(
                f"round {i}: a region group's embedding trie needs "
                f"{peak_trie_bytes / 1e6:.0f}MB, over the per-machine budget"
            )

        # ---- verify & filter: EVI = distinct undetermined pairs ----
        for x, u in pending:
            n_pairs = sum(r[f"__p_{x}_{u}"] for r in grouped)
            if n_pairs:
                metrics.add_comm("verifyE", n_pairs * VERIFY_PAIR_BYTES)
            R = R.filter(F.col(f"__ex_{x}_{u}")).drop(
                f"__ex_{x}_{u}", f"__ud_{x}_{u}"
            )
        R = R.localCheckpoint()
    return R


def _with_cached_flag(R: DataFrame, cache: DataFrame, vcol: str, flag: str) -> DataFrame:
    """Mark rows whose ``vcol`` vertex is in machine m's fetch cache."""
    c = cache.select(
        F.col("m"), F.col("v").alias(vcol), F.lit(True).alias(flag)
    )
    # the per-machine fetch cache is small relative to embeddings —
    # broadcast it like the replicated ownership map
    return R.join(F.broadcast(c), ["m", vcol], "left").withColumn(
        flag, F.coalesce(F.col(flag), F.lit(False))
    )
