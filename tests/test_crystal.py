"""Crystal baseline tests: clique-index contents vs the oracle, index
size measurement (Table 2's quantities), and oracle-equal execution."""
import duckdb
import pytest

from repro.baselines.crystal import run_crystal
from repro.oracle import assert_equivalent
from repro.query.queries import ALL_QUERIES
from repro.sqlgen import pattern_sql


def _duck_count(pdf, sql):
    con = duckdb.connect()
    con.register("edges", pdf)
    n = con.execute(sql).fetchone()[0]
    con.close()
    return n


def test_index_triangle_count_matches_oracle(gc_dblp, cindex_dblp):
    want = _duck_count(
        gc_dblp.edges_pdf,
        "SELECT count(*) FROM edges a, edges b, edges c "
        "WHERE a.src=b.src AND a.dst=c.src AND b.dst=c.dst "
        "AND a.src<a.dst AND a.dst<b.dst",
    )
    assert cindex_dblp.cliques[3].count() == want


def test_index_cliques_sorted_and_distinct(cindex_dblp):
    t = cindex_dblp.cliques[3]
    assert t.filter("NOT (c0 < c1 AND c1 < c2)").count() == 0
    assert t.distinct().count() == t.count()


def test_index_k4_are_cliques(gc_dblp, cindex_dblp):
    rows = cindex_dblp.cliques[4].limit(20).collect()
    adj = {}
    for a, b in gc_dblp.edges_pdf.itertuples(index=False):
        adj.setdefault(a, set()).add(b)
    import itertools

    for r in rows:
        vs = [r[f"c{i}"] for i in range(4)]
        for x, y in itertools.combinations(vs, 2):
            assert y in adj[x]


def test_index_sizes_measured(cindex_dblp):
    assert cindex_dblp.graph_bytes > 0
    assert cindex_dblp.index_bytes > 0
    assert cindex_dblp.build_s > 0


@pytest.mark.parametrize("qn", ["q1", "q2", "q4", "q5", "q6", "qc1", "qc2", "qc3"])
def test_crystal_oracle(gc_dblp, cindex_dblp, qn):
    p = ALL_QUERIES[qn]
    df, met = run_crystal(gc_dblp, p, cindex_dblp, qn)
    assert not met.failed
    assert_equivalent(df, pattern_sql(p), edges=gc_dblp.edges_pdf)


def test_crystal_core_size_recorded(gc_dblp, cindex_dblp):
    _, met = run_crystal(gc_dblp, ALL_QUERIES["qc2"], cindex_dblp, "qc2")
    assert met.extras["core_size"] == 4
    _, met = run_crystal(gc_dblp, ALL_QUERIES["q1"], cindex_dblp, "q1")
    assert met.extras["core_size"] == 2  # triangle-free: edge start


def test_crystal_clique_query_zero_extension_comm(gc_dblp, cindex_dblp):
    # a pure clique query is answered entirely from the index
    _, met = run_crystal(gc_dblp, ALL_QUERIES["qc2"], cindex_dblp, "qc2")
    assert met.comm_bytes == 0


def test_crystal_budget_failure(gc_lj, spark_tuned, tmp_path):
    from repro.baselines.crystal import build_clique_index

    idx = build_clique_index(gc_lj, str(tmp_path / "idx"))
    df, met = run_crystal(gc_lj, ALL_QUERIES["q6"], idx, "q6", bytes_budget=64)
    assert met.failed and df is None
