"""Table 2 bench — Crystal clique-index build + size per lite dataset."""
import pytest

from benchmarks._util import dump_rows
from repro.papernumbers import TABLE2
from repro.tables import PAPER_NAME

ROWS: list[dict] = []


@pytest.mark.parametrize(
    "name", ["roadnet", "dblp", "livejournal", "uk2002"]
)
def test_table2_index(benchmark, name, request, tmp_path):
    gc = request.getfixturevalue(
        {
            "roadnet": "gcb_road",
            "dblp": "gcb_dblp",
            "livejournal": "gcb_lj",
            "uk2002": "gcb_uk",
        }[name]
    )
    from repro.baselines.crystal import build_clique_index

    idx = benchmark.pedantic(
        build_clique_index, args=(gc, str(tmp_path / "idx")), rounds=1, iterations=1
    )
    assert idx.graph_bytes > 0 and idx.index_bytes > 0
    paper = TABLE2[PAPER_NAME[name]]
    ROWS.append(
        {
            "dataset": gc.name,
            "paper_dataset": PAPER_NAME[name],
            "graph_MB": round(idx.graph_bytes / 1e6, 3),
            "index_MB": round(idx.index_bytes / 1e6, 3),
            "ratio": round(idx.ratio(), 2),
            "build_s": round(idx.build_s, 2),
            "paper_graph": paper["graph"],
            "paper_index": paper["index"],
            "paper_ratio": paper["ratio"],
        }
    )


def teardown_module():
    dump_rows("table2_index", ROWS)
