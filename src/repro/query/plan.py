"""Execution plans (Section 4 of the paper).

A plan is a sequence of decomposition units (Definition 6/7). Plans are
enumerated from spanning trees per the constructive proof of Theorem 1:
rooting a spanning tree T at a non-leaf vertex and emitting one unit per
internal vertex (children = leaves of the unit) yields a valid plan with
as many units as T has internal vertices; an MLST therefore yields the
minimum c_P units. Plan selection follows the paper's rule chain:

1. minimum number of rounds (Theorem 1),
2. minimum span of dp0.piv (Section 4.2),
3. maximum score, eq. (4) which extends eq. (3) with the pivot-degree
   term (Section 4.3).

``random_star_plan`` (RanS) and ``random_minround_plan`` (RanM) are the
two baseline planners of Appendix C.2.
"""
from __future__ import annotations

import itertools
import random
from collections import deque
from dataclasses import dataclass
from functools import cached_property

from repro.query.pattern import Pattern


@dataclass(frozen=True)
class Unit:
    """Decomposition unit: a pivot and its (non-empty) leaf set."""

    piv: int
    leaves: tuple[int, ...]


@dataclass(frozen=True)
class Plan:
    """An execution plan (Definition 7) over ``pattern``."""

    pattern: Pattern
    units: tuple[Unit, ...]

    def __post_init__(self):
        p = self.pattern
        seen: set[int] = set()
        for i, u in enumerate(self.units):
            if not u.leaves:
                raise ValueError(f"unit {i} has no leaves")
            if i == 0:
                seen.add(u.piv)
            elif u.piv not in seen:
                raise ValueError(f"unit {i} pivot {u.piv} not in P_{i-1}")
            for lf in u.leaves:
                if lf in seen:
                    raise ValueError(f"leaf {lf} of unit {i} already placed")
                if not p.has_edge(u.piv, lf):
                    raise ValueError(f"({u.piv},{lf}) is not a pattern edge")
            seen.update(u.leaves)
        if seen != set(range(p.n)):
            raise ValueError("plan does not cover all pattern vertices")

    @property
    def rounds(self) -> int:
        """Number of rounds = number of decomposition units."""
        return len(self.units)

    def prefix_vertices(self, i: int) -> set[int]:
        """V_{P_{i-1}}: vertices matched before unit ``i`` starts."""
        vs: set[int] = set()
        for j in range(i):
            vs.add(self.units[j].piv)
            vs.update(self.units[j].leaves)
        if i > 0:
            vs.add(self.units[0].piv)
        return vs

    def star_edges(self, i: int) -> list[tuple[int, int]]:
        """Expansion edges of unit i: pivot→leaf."""
        u = self.units[i]
        return [(u.piv, lf) for lf in u.leaves]

    def sib_edges(self, i: int) -> list[tuple[int, int]]:
        """Sibling (verification) edges: pattern edges between leaves of unit i."""
        u = self.units[i]
        lf = set(u.leaves)
        return [(a, b) for a, b in self.pattern.edges if a in lf and b in lf]

    def cro_edges(self, i: int) -> list[tuple[int, int]]:
        """Cross-unit (verification) edges: pattern edges from P_{i-1} to
        the leaves of unit i, excluding the pivot→leaf expansion edges."""
        if i == 0:
            return []
        u = self.units[i]
        prev = self.prefix_vertices(i)
        lf = set(u.leaves)
        out = []
        for a, b in self.pattern.edges:
            if a in lf and b in lf:
                continue  # sibling edge
            x, y = (a, b) if b in lf else (b, a)
            if y in lf and x in prev and not (x == u.piv):
                out.append((x, y))
        return out

    def score(self, rho: float = 1.0, with_degree: bool = True) -> float:
        """Score of eq. (4) (or eq. (3) when ``with_degree`` is False)."""
        s = 0.0
        for i, u in enumerate(self.units):
            nv = len(self.sib_edges(i)) + len(self.cro_edges(i))
            s += nv / (i + 1) ** rho
            if with_degree:
                s += self.pattern.degree(u.piv) / (i + 1)
        return s

    @cached_property
    def matching_order(self) -> tuple[int, ...]:
        """Definition 10: the global order in which query vertices match.

        Within each unit's leaves: pivots of later units come first (in
        unit-index order), then non-pivots in descending pattern degree,
        ties by vertex id.
        """
        pivot_unit = {u.piv: j for j, u in enumerate(self.units)}
        order: list[int] = [self.units[0].piv]
        for u in self.units:
            pivs = sorted(
                (lf for lf in u.leaves if lf in pivot_unit),
                key=lambda x: pivot_unit[x],
            )
            rest = sorted(
                (lf for lf in u.leaves if lf not in pivot_unit),
                key=lambda x: (-self.pattern.degree(x), x),
            )
            order.extend(pivs + rest)
        assert len(order) == self.pattern.n and len(set(order)) == self.pattern.n
        return tuple(order)

    def leaf_order(self, i: int) -> list[int]:
        """Leaves of unit i in matching order."""
        mo = {v: k for k, v in enumerate(self.matching_order)}
        return sorted(self.units[i].leaves, key=lambda x: mo[x])

    def verification_edges_for_leaf(self, i: int, leaf: int) -> list[tuple[int, int]]:
        """Verification edges (sibling + cross-unit) of unit i incident to
        ``leaf`` whose other endpoint matches earlier — the edges to
        check/queue the moment ``leaf`` is matched."""
        mo = {v: k for k, v in enumerate(self.matching_order)}
        out = []
        for a, b in self.sib_edges(i) + self.cro_edges(i):
            x, y = (a, b) if b == leaf else (b, a)
            if y == leaf and mo[x] < mo[leaf]:
                out.append((x, leaf))
        return out

    def __str__(self) -> str:
        us = "; ".join(f"dp{i}: {u.piv}->{list(u.leaves)}" for i, u in enumerate(self.units))
        return f"Plan[{self.pattern.name}]({us})"


# ---------------- spanning trees / MLST ----------------

def spanning_trees(p: Pattern) -> list[tuple[tuple[int, int], ...]]:
    """All spanning trees of the (small) pattern, as edge tuples."""
    if p.n == 1:
        return [()]
    out = []
    for comb in itertools.combinations(p.edges, p.n - 1):
        parent = list(range(p.n))

        def find(x):
            while parent[x] != x:
                parent[x] = parent[parent[x]]
                x = parent[x]
            return x

        acyclic = True
        for a, b in comb:
            ra, rb = find(a), find(b)
            if ra == rb:
                acyclic = False
                break
            parent[ra] = rb
        if acyclic:
            out.append(comb)
    return out


def tree_leaf_count(tree: tuple[tuple[int, int], ...], n: int) -> int:
    """Number of degree-1 vertices of the tree."""
    deg = [0] * n
    for a, b in tree:
        deg[a] += 1
        deg[b] += 1
    return sum(1 for d in deg if d == 1)


def max_leaf_number(p: Pattern) -> int:
    """l_P: leaves of a maximum-leaf spanning tree (Definition 8)."""
    return max(tree_leaf_count(t, p.n) for t in spanning_trees(p))


def connected_domination_number(p: Pattern) -> int:
    """c_P = |V_P| - l_P (Douglas 1992, cited as [4])."""
    if p.n <= 2:
        return 1
    return p.n - max_leaf_number(p)


def _plan_from_rooted_tree(p: Pattern, tree, root: int) -> Plan | None:
    """Theorem 1 construction: one unit per internal vertex, BFS order."""
    adj: dict[int, set[int]] = {u: set() for u in range(p.n)}
    for a, b in tree:
        adj[a].add(b)
        adj[b].add(a)
    if p.n > 1 and len(adj[root]) == 0:
        return None
    units: list[Unit] = []
    visited = {root}
    q = deque([root])
    children: dict[int, list[int]] = {}
    order: list[int] = []
    while q:
        x = q.popleft()
        order.append(x)
        ch = sorted(adj[x] - visited)
        children[x] = ch
        visited.update(ch)
        q.extend(ch)
    for x in order:
        if children[x]:
            units.append(Unit(x, tuple(children[x])))
    if not units:
        return None
    return Plan(p, tuple(units))


def _unit_permutations(plan: Plan) -> list[Plan]:
    """All valid reorderings of a plan's units (first unit may change as
    long as Definition 7 holds). Unit counts are tiny (≤ ~4)."""
    out = []
    for perm in itertools.permutations(plan.units):
        try:
            out.append(Plan(plan.pattern, perm))
        except ValueError:
            continue
    return out


def enumerate_plans(p: Pattern, with_permutations: bool = True) -> list[Plan]:
    """All tree-derived plans (× all roots, × valid unit orders)."""
    seen: set[tuple] = set()
    plans: list[Plan] = []
    for tree in spanning_trees(p):
        for root in range(p.n):
            pl = _plan_from_rooted_tree(p, tree, root)
            if pl is None:
                continue
            cands = _unit_permutations(pl) if with_permutations else [pl]
            for c in cands:
                key = tuple((u.piv, u.leaves) for u in c.units)
                if key not in seen:
                    seen.add(key)
                    plans.append(c)
    return plans


def choose_plan(p: Pattern, rho: float = 1.0) -> Plan:
    """The paper's planner: min rounds → min span(dp0.piv) → max eq.(4)."""
    plans = enumerate_plans(p)
    min_rounds = min(pl.rounds for pl in plans)
    plans = [pl for pl in plans if pl.rounds == min_rounds]
    min_span = min(p.span(pl.units[0].piv) for pl in plans)
    plans = [pl for pl in plans if p.span(pl.units[0].piv) == min_span]
    best = max(
        plans,
        key=lambda pl: (pl.score(rho=rho, with_degree=True), str(pl)),
    )
    return best


def random_star_plan(p: Pattern, seed: int = 0) -> Plan:
    """RanS (Appendix C.2): a random star decomposition — a plan from a
    uniformly random spanning tree and random root, no optimization."""
    rng = random.Random(seed)
    trees = spanning_trees(p)
    while True:
        tree = rng.choice(trees)
        root = rng.randrange(p.n)
        pl = _plan_from_rooted_tree(p, tree, root)
        if pl is not None:
            return pl


def random_minround_plan(p: Pattern, seed: int = 0) -> Plan:
    """RanM (Appendix C.2): a random plan among the minimum-round plans,
    ignoring the span/score heuristics of Sections 4.2–4.3."""
    rng = random.Random(seed)
    plans = enumerate_plans(p, with_permutations=False)
    min_rounds = min(pl.rounds for pl in plans)
    return rng.choice([pl for pl in plans if pl.rounds == min_rounds])
