"""Table 3 bench — EL vs ET intermediate-result size, RoadNet-lite."""
import pytest

from benchmarks._util import dump_rows
from repro.papernumbers import TABLE3_ROADNET_MB
from repro.query.queries import QUERIES
from repro.tables import compression_rows

ROWS: list[dict] = []


@pytest.mark.parametrize("qn", sorted(QUERIES))
def test_table3_compression_roadnet(benchmark, gcb_road, qn):
    rows = benchmark.pedantic(
        compression_rows, args=(gcb_road, {qn: QUERIES[qn]}), rounds=1, iterations=1
    )
    r = rows[0]
    paper = TABLE3_ROADNET_MB[qn]
    r["paper_EL_MB"] = paper["EL"]
    r["paper_ET_MB"] = paper["ET"]
    ROWS.append(r)
    assert r["EL_MB"] > 0 and r["ET_MB"] > 0


def teardown_module():
    dump_rows("table3_compress_roadnet", ROWS)
