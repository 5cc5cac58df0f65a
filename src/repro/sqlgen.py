"""Generate the DuckDB oracle SQL for a subgraph-enumeration query.

A pattern with vertices u0..uk and edge set E becomes a conjunctive
self-join over a *symmetric* edge table ``edges(src, dst)``: one table
instance per pattern edge, injectivity as pairwise ``<>``, and the same
symmetry-breaking ``<`` constraints the engines use. The resulting row
set (columns u0..uk) must equal every engine's embedding DataFrame —
checked by ``repro.oracle.assert_equivalent``.
"""
from repro.query.pattern import Pattern


def pattern_sql(p: Pattern, table: str = "edges", symmetry_breaking: bool = True) -> str:
    """SQL whose rows are the embeddings of ``p`` (one column per query
    vertex, named u0..u{n-1}) over the symmetric edge table ``table``."""
    rels = [f"{table} e{k}" for k in range(len(p.edges))]
    # Bind each vertex variable to the first relation column mentioning it.
    binding: dict[int, str] = {}
    for k, (a, b) in enumerate(p.edges):
        if a not in binding:
            binding[a] = f"e{k}.src"
        if b not in binding:
            binding[b] = f"e{k}.dst"
    preds: list[str] = []
    for k, (a, b) in enumerate(p.edges):
        if binding[a] != f"e{k}.src":
            preds.append(f"e{k}.src = {binding[a]}")
        if binding[b] != f"e{k}.dst":
            preds.append(f"e{k}.dst = {binding[b]}")
    for a in range(p.n):
        for b in range(a + 1, p.n):
            if not p.has_edge(a, b):
                preds.append(f"{binding[a]} <> {binding[b]}")
    if symmetry_breaking:
        for a, b in p.symmetry_breaking_pairs:
            preds.append(f"{binding[a]} < {binding[b]}")
    cols = ", ".join(f"{binding[u]} AS u{u}" for u in range(p.n))
    where = " AND ".join(preds) if preds else "TRUE"
    return f"SELECT {cols} FROM {', '.join(rels)} WHERE {where}"
