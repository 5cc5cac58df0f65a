"""Region-group tests (Algorithm 3): coverage, cap, proximity behaviour
on the paper's Figure 6 scenario, and the Spark per-machine wrapper."""
import pytest
from pyspark.sql import functions as F

from repro.core.regions import (
    assign_region_groups_spark,
    greedy_region_groups,
    proximity,
)


def _fig6_adj():
    """Figure 6 flavour: v0 and v1 share most neighbours; v2, v3 live in
    another neighbourhood."""
    edges = [
        (0, 10), (0, 11), (0, 12),
        (1, 10), (1, 11), (1, 13),
        (2, 20), (2, 21), (2, 22),
        (3, 20), (3, 21), (3, 23),
        (10, 20),
    ]
    adj = {}
    for a, b in edges:
        adj.setdefault(a, set()).add(b)
        adj.setdefault(b, set()).add(a)
    return adj


def test_proximity_eq5():
    adj = _fig6_adj()
    assert proximity(adj, 1, [0]) == pytest.approx(2 / 3)  # v10,v11 of 3
    assert proximity(adj, 2, [0]) == pytest.approx(0.0)


def test_grouping_prefers_similar_vertices():
    adj = _fig6_adj()
    groups = greedy_region_groups(adj, [0, 1, 2, 3], max_group_size=2, seed=0)
    assert groups[0] == groups[1]
    assert groups[2] == groups[3]
    assert groups[0] != groups[2]


def test_grouping_covers_everything():
    adj = _fig6_adj()
    groups = greedy_region_groups(adj, [0, 1, 2, 3], max_group_size=3, seed=1)
    assert set(groups) == {0, 1, 2, 3}


@pytest.mark.parametrize("cap", [1, 2, 4])
def test_group_size_cap(cap):
    adj = _fig6_adj()
    groups = greedy_region_groups(adj, [0, 1, 2, 3], max_group_size=cap, seed=0)
    from collections import Counter

    assert max(Counter(groups.values()).values()) <= cap


def test_disconnected_candidates_get_groups():
    adj = {0: {10}, 1: {11}, 10: {0}, 11: {1}}
    groups = greedy_region_groups(adj, [0, 1], max_group_size=5, seed=0)
    assert set(groups) == {0, 1}
    assert groups[0] != groups[1]  # zero proximity → separate regions


def test_spark_region_groups(gc_dblp):
    p_deg = 2
    cands = (
        gc_dblp.degrees.filter(F.col("deg") >= p_deg)
        .join(F.broadcast(gc_dblp.owner), "v")
        .select("v", "machine")
    )
    n_cands = cands.count()
    out = assign_region_groups_spark(gc_dblp, cands, max_group_size=10)
    rows = out.collect()
    assert len(rows) == n_cands  # every candidate assigned exactly once
    from collections import Counter

    sizes = Counter((r["machine"], r["g"]) for r in rows)
    assert max(sizes.values()) <= 10
    # groups respect machine ownership
    for r in rows:
        assert gc_dblp.owner_np[r["v"]] == r["machine"]
