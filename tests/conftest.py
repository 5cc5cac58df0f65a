"""Shared fixtures: tiny GraphContexts per dataset (session-scoped so
the Spark caches amortize across test modules) and the Crystal index.

Shuffle partitions are tuned down at runtime for the tiny inputs — a
per-workload knob; broadcast joins stay disabled as the root conftest
dictates (the expansion/join dataflow still exercises shuffles).
"""
import pytest

from repro.baselines.crystal import build_clique_index
from repro.graphs.datasets import make_context


@pytest.fixture(scope="session")
def spark_tuned(spark):
    spark.conf.set("spark.sql.shuffle.partitions", 8)
    return spark


@pytest.fixture(scope="session")
def gc_dblp(spark_tuned):
    return make_context(spark_tuned, "dblp", "tiny", m=3)


@pytest.fixture(scope="session")
def gc_road(spark_tuned):
    return make_context(spark_tuned, "roadnet", "tiny", m=4)


@pytest.fixture(scope="session")
def gc_lj(spark_tuned):
    return make_context(spark_tuned, "livejournal", "tiny", m=3)


@pytest.fixture(scope="session")
def gc_uk(spark_tuned):
    return make_context(spark_tuned, "uk2002", "tiny", m=3)


@pytest.fixture(scope="session")
def gc_dblp_hash(spark_tuned):
    return make_context(spark_tuned, "dblp", "tiny", m=3, partitioner="hash")


@pytest.fixture(scope="session")
def cindex_dblp(gc_dblp, tmp_path_factory):
    return build_clique_index(gc_dblp, str(tmp_path_factory.mktemp("cidx_dblp")))
