"""Region groups (Section 6, Algorithm 3).

Candidates of dp0.piv on each machine are split into groups processed
independently, bounding peak memory. Groups are grown greedily by
*proximity* — the fraction of a candidate's neighbors already adjacent
to the group (eq. 5) — so candidates that will share fetched foreign
vertices and verification edges land together.

The memory test ``φ(rg) < Φ`` is modeled by a per-group candidate cap:
the engine estimates rows-per-candidate from SM-E (exactly the paper's
estimator: average embedding-trie cost of local embeddings) and divides
the budget by it.
"""
from __future__ import annotations

import random
from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.datasets import GraphContext


def greedy_region_groups(
    adj: dict[int, set[int]],
    candidates: Iterable[int],
    max_group_size: int,
    seed: int = 0,
) -> dict[int, int]:
    """Algorithm 3 run to exhaustion: returns candidate → group id.

    Incremental proximity: ``num[w]`` counts w's neighbors inside the
    group's neighborhood N(rg); adding a member only touches the
    2-hop fringe, so the whole grouping is O(Σ deg)."""
    remaining = sorted(set(candidates))
    rng = random.Random(seed)
    group_of: dict[int, int] = {}
    g = 0
    remaining_set = set(remaining)
    while remaining_set:
        start = rng.choice(sorted(remaining_set))
        members = [start]
        remaining_set.discard(start)
        nbhd: set[int] = set()
        num: dict[int, int] = {}

        def absorb(u: int) -> None:
            for x in adj.get(u, ()):
                if x in nbhd:
                    continue
                nbhd.add(x)
                for w in adj.get(x, ()):
                    if w in remaining_set:
                        num[w] = num.get(w, 0) + 1

        absorb(start)
        while remaining_set and len(members) < max_group_size:
            # argmax proximity = num[w]/deg(w); vertices with no overlap
            # only if nothing overlaps (then pick any, per Algorithm 3's
            # outer loop restart — we keep growing to bound group count)
            best, best_p = None, -1.0
            for w, c in num.items():
                if w not in remaining_set:
                    continue
                p = c / max(1, len(adj.get(w, ())))
                if p > best_p or (p == best_p and (best is None or w < best)):
                    best, best_p = w, p
            if best is None:
                break  # no candidate touches the region: start a new group
            members.append(best)
            remaining_set.discard(best)
            absorb(best)
        for v in members:
            group_of[v] = g
        g += 1
    return group_of


def proximity(adj: dict[int, set[int]], v: int, rg: Iterable[int]) -> float:
    """Eq. (5): fraction of v's neighbors adjacent to the group."""
    nb = set()
    for u in rg:
        nb |= adj.get(u, set())
    d = adj.get(v, set())
    return len(d & nb) / max(1, len(d))


def assign_region_groups_spark(
    gc: GraphContext, candidates: DataFrame, max_group_size: int, seed: int = 0
) -> DataFrame:
    """Per-machine Algorithm 3 via ``applyInPandas``: (machine, v, g).

    Proximity only looks at local adjacency (the machine groups its own
    candidates before any communication happens)."""
    le = gc.edges_o.filter(F.col("src_m") == F.col("dst_m")).select(
        F.col("src_m").alias("machine"),
        F.col("src").alias("a"),
        F.col("dst").alias("b"),
        F.lit(0).alias("kind"),
    )
    payload = le.unionByName(
        candidates.select(
            "machine", F.col("v").alias("a"), F.lit(-1).alias("b"),
            F.lit(1).alias("kind"),
        )
    )

    def run(pdf: pd.DataFrame) -> pd.DataFrame:
        m = int(pdf["machine"].iloc[0])
        edges = pdf[pdf["kind"] == 0]
        cands = [int(v) for v in pdf.loc[pdf["kind"] == 1, "a"]]
        adj: dict[int, set[int]] = {}
        for s, d in zip(edges["a"].to_numpy(), edges["b"].to_numpy()):
            adj.setdefault(int(s), set()).add(int(d))
        groups = greedy_region_groups(adj, cands, max_group_size, seed=seed + m)
        return pd.DataFrame(
            {"machine": m, "v": list(groups), "g": [groups[v] for v in groups]}
        )

    return payload.groupBy("machine").applyInPandas(
        run, schema="machine int, v long, g int"
    )
