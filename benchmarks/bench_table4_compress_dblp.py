"""Table 4 bench — EL vs ET intermediate-result size, DBLP-lite."""
import pytest

from benchmarks._util import dump_rows
from repro.papernumbers import TABLE4_DBLP_GB
from repro.query.queries import QUERIES
from repro.tables import compression_rows

ROWS: list[dict] = []


@pytest.mark.parametrize("qn", sorted(QUERIES))
def test_table4_compression_dblp(benchmark, gcb_dblp, qn):
    rows = benchmark.pedantic(
        compression_rows, args=(gcb_dblp, {qn: QUERIES[qn]}), rounds=1, iterations=1
    )
    r = rows[0]
    paper = TABLE4_DBLP_GB[qn]
    r["paper_EL_GB"] = paper["EL"]
    r["paper_ET_GB"] = paper["ET"]
    ROWS.append(r)
    assert r["EL_MB"] > 0 and r["ET_MB"] > 0


def teardown_module():
    dump_rows("table4_compress_dblp", ROWS)
