"""Benchmark fixtures: lite-scale GraphContexts (session-scoped — the
builds and Spark caches amortize over all benches) and a JSON results
sink under results/ that EXPERIMENTS.md is assembled from."""
import pytest

from repro.baselines.crystal import build_clique_index
from repro.graphs.datasets import make_context

#: machines in the simulated cluster — the paper's main cluster had 10
M = 10


@pytest.fixture(scope="session")
def sparkb(spark):
    spark.conf.set("spark.sql.shuffle.partitions", 32)
    return spark


@pytest.fixture(scope="session")
def gcb_road(sparkb):
    return make_context(sparkb, "roadnet", "lite", m=M)


@pytest.fixture(scope="session")
def gcb_dblp(sparkb):
    return make_context(sparkb, "dblp", "lite", m=M)


@pytest.fixture(scope="session")
def gcb_lj(sparkb):
    return make_context(sparkb, "livejournal", "lite", m=M)


@pytest.fixture(scope="session")
def gcb_uk(sparkb):
    return make_context(sparkb, "uk2002", "lite", m=M)


@pytest.fixture(scope="session")
def cindexb_road(gcb_road, tmp_path_factory):
    return build_clique_index(gcb_road, str(tmp_path_factory.mktemp("cidx_road")))


@pytest.fixture(scope="session")
def cindexb_dblp(gcb_dblp, tmp_path_factory):
    return build_clique_index(gcb_dblp, str(tmp_path_factory.mktemp("cidx_dblp")))


@pytest.fixture(scope="session")
def cindexb_lj(gcb_lj, tmp_path_factory):
    return build_clique_index(gcb_lj, str(tmp_path_factory.mktemp("cidx_lj")))


@pytest.fixture(scope="session")
def cindexb_uk(gcb_uk, tmp_path_factory):
    return build_clique_index(gcb_uk, str(tmp_path_factory.mktemp("cidx_uk")))
