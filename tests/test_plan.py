"""Execution-plan tests: Theorem 1, the paper's Example 4/5 numbers,
matching order (Definition 10), the selection rule chain, RanS/RanM."""
import pytest

from repro.query.pattern import Pattern
from repro.query.plan import (
    Plan,
    Unit,
    choose_plan,
    connected_domination_number,
    enumerate_plans,
    max_leaf_number,
    random_minround_plan,
    random_star_plan,
    spanning_trees,
    tree_leaf_count,
)
from repro.query.queries import ALL_QUERIES, FIG2_PATTERN, QUERIES

TRIANGLE = Pattern(3, ((0, 1), (1, 2), (0, 2)))


# ---------------- spanning trees / MLST / c_P ----------------

def test_spanning_tree_count_triangle():
    assert len(spanning_trees(TRIANGLE)) == 3


def test_spanning_tree_count_k4():
    assert len(spanning_trees(ALL_QUERIES["qc2"])) == 16  # Cayley: 4^2


def test_tree_leaf_count():
    t = ((0, 1), (0, 2), (0, 3))
    assert tree_leaf_count(t, 4) == 3


def test_fig2_mlst_and_cp():
    # Example 4: the MLST has 7 leaves; |V|=10 so c_P = 3
    assert max_leaf_number(FIG2_PATTERN) == 7
    assert connected_domination_number(FIG2_PATTERN) == 3


@pytest.mark.parametrize(
    "qn,cp",
    [("q1", 2), ("q2", 1), ("q3", 3), ("q4", 2), ("q5", 3),
     ("q6", 4), ("q7", 2), ("q8", 2), ("qc2", 1)],
)
def test_connected_domination_numbers(qn, cp):
    assert connected_domination_number(ALL_QUERIES[qn]) == cp


def test_vp_equals_cp_plus_lp():
    # Douglas 1992 identity the paper cites: |V_P| = c_P + l_P
    for p in ALL_QUERIES.values():
        assert p.n == connected_domination_number(p) + max_leaf_number(p)


# ---------------- Plan validity (Definitions 6 & 7) ----------------

def test_plan_rejects_uncovered_vertices():
    with pytest.raises(ValueError):
        Plan(TRIANGLE, (Unit(0, (1,)),))


def test_plan_rejects_pivot_not_in_prefix():
    p = QUERIES["q3"]
    with pytest.raises(ValueError):
        Plan(p, (Unit(0, (1, 4)), Unit(2, (3,))))  # 2 not matched yet


def test_plan_rejects_releaf():
    with pytest.raises(ValueError):
        Plan(TRIANGLE, (Unit(0, (1, 2)), Unit(1, (2,))))


def test_plan_rejects_non_edge_leaf():
    p = QUERIES["q1"]
    with pytest.raises(ValueError):
        Plan(p, (Unit(0, (2,)),))  # (0,2) not an edge of the square


# ---------------- Example 4 & 5 ----------------

def _pl1():
    return Plan(FIG2_PATTERN, (Unit(0, (1, 2, 7, 8, 9)), Unit(1, (3, 4)), Unit(2, (5, 6))))


def _pl2():
    return Plan(FIG2_PATTERN, (Unit(1, (0, 3, 4)), Unit(0, (2, 7, 8, 9)), Unit(2, (5, 6))))


def test_example5_scores():
    # paper: SC(PL1) = 2/1 + 1/2 + 2/3 ≈ 3.2, SC(PL2) = 1 + 1 + 2/3 ≈ 2.7
    assert _pl1().score(with_degree=False) == pytest.approx(2 + 0.5 + 2 / 3)
    assert _pl2().score(with_degree=False) == pytest.approx(1 + 1 + 2 / 3)
    assert _pl1().score(with_degree=False) > _pl2().score(with_degree=False)


def test_example3_edge_classes():
    # dp0: sib {(u1,u2)}, cro ∅; dp2 (=unit idx 2 in PL of Example 3) has
    # sib {(u5,u6)} and cro {(u4,u5)}
    pl = Plan(
        FIG2_PATTERN,
        (Unit(0, (1, 2, 7)), Unit(1, (3, 4)), Unit(2, (5, 6)), Unit(0, (8, 9))),
    )
    assert pl.sib_edges(0) == [(1, 2)]
    assert pl.cro_edges(0) == []
    assert pl.sib_edges(2) == [(5, 6)]
    assert pl.cro_edges(2) == [(4, 5)]
    assert pl.sib_edges(3) == [(8, 9)]


def test_theorem1_minimum_rounds():
    for qn, p in ALL_QUERIES.items():
        plans = enumerate_plans(p, with_permutations=False)
        assert min(pl.rounds for pl in plans) == connected_domination_number(p), qn


# ---------------- matching order (Definition 10) ----------------

def test_matching_order_example():
    # paper: PL1 of Example 4 orders vertices u0,u1,u2,u7,u8,u9,u3..u6 —
    # modulo condition (3)(ii) ties among the degree-1 leaves u7,u8,u9
    mo = _pl1().matching_order
    assert mo[0:3] == (0, 1, 2)
    assert set(mo[3:6]) == {7, 8, 9}
    assert mo[6:8] == (3, 4) or set(mo[6:8]) == {3, 4}
    assert set(mo[8:10]) == {5, 6}


def test_matching_order_is_total_order():
    for p in ALL_QUERIES.values():
        pl = choose_plan(p)
        assert sorted(pl.matching_order) == list(range(p.n))


def test_matching_order_pivot_before_leaves():
    for p in ALL_QUERIES.values():
        pl = choose_plan(p)
        pos = {u: i for i, u in enumerate(pl.matching_order)}
        for i, u in enumerate(pl.units):
            for lf in u.leaves:
                assert pos[u.piv] < pos[lf]


def test_leaf_order_and_verification_edges():
    pl = choose_plan(QUERIES["q4"])
    for i in range(pl.rounds):
        los = pl.leaf_order(i)
        assert set(los) == set(pl.units[i].leaves)
        for lf in los:
            for a, b in pl.verification_edges_for_leaf(i, lf):
                assert b == lf
                assert QUERIES["q4"].has_edge(a, b)


def test_every_leaf_verification_edge_covered_once():
    # sibling+cross edges of each unit are each checked exactly once
    for p in ALL_QUERIES.values():
        pl = choose_plan(p)
        for i in range(pl.rounds):
            want = {tuple(sorted(e)) for e in pl.sib_edges(i) + pl.cro_edges(i)}
            got = []
            for lf in pl.leaf_order(i):
                got += [tuple(sorted(e)) for e in pl.verification_edges_for_leaf(i, lf)]
            assert sorted(got) == sorted(want), (p.name, i)


def test_plan_edges_cover_pattern():
    # star + sibling + cross edges over all units == E_P exactly
    for p in ALL_QUERIES.values():
        pl = choose_plan(p)
        covered = set()
        for i in range(pl.rounds):
            covered |= {tuple(sorted(e)) for e in pl.star_edges(i)}
            covered |= {tuple(sorted(e)) for e in pl.sib_edges(i)}
            covered |= {tuple(sorted(e)) for e in pl.cro_edges(i)}
        assert covered == set(p.edges), p.name


# ---------------- selection rules ----------------

def test_choose_plan_minimizes_rounds():
    for p in ALL_QUERIES.values():
        assert choose_plan(p).rounds == connected_domination_number(p)


def test_choose_plan_minimizes_start_span():
    p = ALL_QUERIES["q5"]
    pl = choose_plan(p)
    min_rounds = connected_domination_number(p)
    spans = [
        p.span(x.units[0].piv)
        for x in enumerate_plans(p)
        if x.rounds == min_rounds
    ]
    assert p.span(pl.units[0].piv) == min(spans)


def test_section42_span_tiebreak():
    # Figure 4's idea: prefer the min-round plan whose dp0.piv has the
    # smallest span. On q5, u2 (span 2) must beat end-heavy pivots.
    p = QUERIES["q5"]
    pl = choose_plan(p)
    assert p.span(pl.units[0].piv) == min(p.span(u) for u in range(p.n))


def test_random_planners_valid():
    for seed in range(5):
        for p in (QUERIES["q4"], QUERIES["q6"], FIG2_PATTERN):
            ps = random_star_plan(p, seed=seed)
            pm = random_minround_plan(p, seed=seed)
            assert isinstance(ps, Plan) and isinstance(pm, Plan)
            assert pm.rounds == connected_domination_number(p)


def test_random_minround_can_differ_from_chosen():
    p = FIG2_PATTERN
    plans = {str(random_minround_plan(p, seed=s)) for s in range(10)}
    assert len(plans) > 1  # the seed actually varies the plan
