"""Unit tests for the Pattern layer: structure, distances, spans,
automorphisms and the soundness/completeness of symmetry breaking."""
import itertools

import pytest

from repro.query.pattern import Pattern, count_injective_homomorphisms
from repro.query.queries import ALL_QUERIES, FIG2_PATTERN, QUERIES

TRIANGLE = Pattern(3, ((0, 1), (1, 2), (0, 2)), "triangle")
PATH3 = Pattern(3, ((0, 1), (1, 2)), "path3")
STAR4 = Pattern(4, ((0, 1), (0, 2), (0, 3)), "star4")


# ---------------- construction ----------------

def test_edges_canonicalized():
    p = Pattern(3, ((1, 0), (2, 1), (2, 0)))
    assert p.edges == ((0, 1), (0, 2), (1, 2))


def test_rejects_self_loop():
    with pytest.raises(ValueError):
        Pattern(2, ((0, 0),))


def test_rejects_duplicate_edge():
    with pytest.raises(ValueError):
        Pattern(2, ((0, 1), (1, 0)))


def test_rejects_disconnected():
    with pytest.raises(ValueError):
        Pattern(4, ((0, 1), (2, 3)))


def test_rejects_out_of_range():
    with pytest.raises(ValueError):
        Pattern(2, ((0, 2),))


# ---------------- degrees / adjacency ----------------

def test_degrees_triangle():
    assert [TRIANGLE.degree(u) for u in range(3)] == [2, 2, 2]


def test_degrees_star():
    assert STAR4.degree(0) == 3
    assert all(STAR4.degree(u) == 1 for u in (1, 2, 3))


def test_has_edge():
    assert PATH3.has_edge(0, 1) and PATH3.has_edge(1, 0)
    assert not PATH3.has_edge(0, 2)


# ---------------- distances / span / diameter ----------------

def test_dist_path():
    assert PATH3.dist(0, 2) == 2
    assert PATH3.dist(0, 0) == 0


@pytest.mark.parametrize(
    "p,u,expected",
    [(PATH3, 0, 2), (PATH3, 1, 1), (TRIANGLE, 0, 1), (STAR4, 0, 1), (STAR4, 1, 2)],
)
def test_span(p, u, expected):
    assert p.span(u) == expected


def test_diameter():
    assert PATH3.diameter == 2
    assert TRIANGLE.diameter == 1
    assert QUERIES["q6"].diameter == 3


def test_fig2_spans():
    # Section 4.2 hinges on span(u0)=2 for the running example
    assert FIG2_PATTERN.span(0) == 2
    assert FIG2_PATTERN.span(3) == 3


# ---------------- automorphisms ----------------

@pytest.mark.parametrize(
    "p,n_aut",
    [
        (TRIANGLE, 6),
        (PATH3, 2),
        (STAR4, 6),
        (QUERIES["q1"], 8),       # square: dihedral group D4
        (QUERIES["q3"], 10),      # 5-cycle: D5
        (QUERIES["q6"], 12),      # 6-cycle: D6
        (ALL_QUERIES["qc2"], 24), # K4: S4
    ],
)
def test_automorphism_group_size(p, n_aut):
    assert len(p.automorphisms) == n_aut


def test_automorphisms_are_permutations():
    for g in QUERIES["q4"].automorphisms:
        assert sorted(g) == list(range(5))


def test_identity_always_present():
    for p in ALL_QUERIES.values():
        assert tuple(range(p.n)) in p.automorphisms


# ---------------- symmetry breaking ----------------

def _brute_embeddings(p: Pattern, adj: dict[int, set[int]], sb: bool):
    out = []
    for perm in itertools.permutations(sorted(adj), p.n):
        if not all(perm[b] in adj[perm[a]] for a, b in p.edges):
            continue
        if sb and not all(perm[a] < perm[b] for a, b in p.symmetry_breaking_pairs):
            continue
        out.append(perm)
    return out


def _k5_adj():
    return {v: {w for w in range(5) if w != v} for v in range(5)}


def _random_adj(seed: int, n: int = 8, p: float = 0.45):
    import random

    rng = random.Random(seed)
    adj = {v: set() for v in range(n)}
    for a in range(n):
        for b in range(a + 1, n):
            if rng.random() < p:
                adj[a].add(b)
                adj[b].add(a)
    return adj


@pytest.mark.parametrize("qn", sorted(ALL_QUERIES))
@pytest.mark.parametrize("seed", [0, 1])
def test_symmetry_breaking_partitions_exactly(qn, seed):
    """#injective homs == #sb-embeddings × |Aut|: SB keeps exactly one
    representative per automorphism class (soundness + completeness)."""
    p = ALL_QUERIES[qn]
    adj = _random_adj(seed)
    full = count_injective_homomorphisms(p, adj)
    kept = len(_brute_embeddings(p, adj, sb=True))
    assert full == kept * len(p.automorphisms)


def test_symmetry_breaking_on_clique_host():
    p = ALL_QUERIES["qc2"]  # K4 in K5: C(5,4) distinct subgraphs
    kept = len(_brute_embeddings(p, _k5_adj(), sb=True))
    assert kept == 5


# ---------------- cliques ----------------

def test_cliques():
    assert QUERIES["q2"].cliques(3) == [(0, 1, 2)]
    assert ALL_QUERIES["qc2"].cliques(4) == [(0, 1, 2, 3)]
    assert QUERIES["q1"].cliques(3) == []


@pytest.mark.parametrize(
    "qn,size", [("q1", 2), ("q2", 3), ("q6", 2), ("qc2", 4), ("qc3", 4)]
)
def test_max_clique(qn, size):
    assert len(ALL_QUERIES[qn].max_clique()) == size


def test_triangle_free_constraint_of_figure7():
    # the reconstruction constraint from the paper's text
    for qn in ("q1", "q3", "q6", "q7", "q8"):
        assert QUERIES[qn].cliques(3) == [], qn
    for qn in ("q2", "q4", "q5"):
        assert (0, 1, 2) in QUERIES[qn].cliques(3), qn


def test_q5_has_end_vertex_u5():
    assert QUERIES["q5"].degree(5) == 1
