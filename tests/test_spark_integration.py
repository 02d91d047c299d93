"""End-to-end Spark-mode integration: the same algorithms fanned out over
the real SparkSession must produce the CHL, with query results diffed
against DuckDB through the oracle."""
import numpy as np
import pytest

from repro.core.gll import gll
from repro.core.lcc import lcc
from repro.core.parapll import spara_pll
from repro.core.query import QueryIndex, labels_spark_df, spark_query_df
from repro.core.reference import ground_truth_pairs
from repro.dist.dgll import dgll
from repro.dist.hybrid import hybrid
from repro.dist.parapll_dist import dpara_pll
from repro.dist.plant_dist import plant_dist
from repro.dist.query_modes import evaluate_query_modes
from repro.oracle import assert_equivalent
from repro.synth_data import graph_edges, query_pairs
from tests.helpers import TEST_SCALE, chl, chl_set, graph, rank_of

NAMES = ["CAL", "SKIT"]


@pytest.mark.parametrize("name", NAMES)
def test_spark_gll_equals_chl(spark, name):
    store, _ = gll(spark, graph(name), rank_of(name), p=8)
    assert store.canonical_set() == chl_set(name)


def test_spark_lcc_equals_chl(spark):
    store, _ = lcc(spark, graph("SKIT"), rank_of("SKIT"), p=8)
    assert store.canonical_set() == chl_set("SKIT")


@pytest.mark.parametrize("name", NAMES)
def test_spark_dgll_equals_chl(spark, name):
    r = dgll(spark, graph(name), rank_of(name), q=4)
    assert r.store.canonical_set() == chl_set(name)


@pytest.mark.parametrize("name", NAMES)
def test_spark_plant_dist_equals_chl(spark, name):
    r = plant_dist(spark, graph(name), rank_of(name), q=4)
    assert r.store.canonical_set() == chl_set(name)
    assert r.stats["comm"]["total_bytes"] == 0


def test_spark_hybrid_equals_chl(spark):
    r = hybrid(spark, graph("SKIT"), rank_of("SKIT"), q=4, psi_th=3.0)
    assert r.store.canonical_set() == chl_set("SKIT")
    assert r.stats["switch_pos"] <= graph("SKIT").n


def test_spark_dparapll_covers(spark):
    name = "SKIT"
    g = graph(name)
    r = dpara_pll(spark, g, rank_of(name), q=4)
    idx = QueryIndex.from_store(r.store)
    pairs = query_pairs(n=g.n, n_queries=150, seed=3).values
    truth = ground_truth_pairs(g, pairs.tolist())
    assert np.array_equal(idx.query_batch(pairs), truth["dist"].values)
    assert r.stats["als"] >= chl(name).als()


def test_spark_sparapll_labels_queryable_via_sql_oracle(spark):
    name = "CAL"
    g = graph(name)
    store, _ = spara_pll(spark, g, rank_of(name), p=8)
    pairs = query_pairs(n=g.n, n_queries=100, seed=5)
    truth = ground_truth_pairs(g, pairs.values.tolist()).reset_index(drop=True)
    truth["qid"] = truth.index.astype("int64")
    qdf = spark_query_df(spark, labels_spark_df(spark, store), pairs)
    assert_equivalent(qdf, "SELECT qid, u, v, dist FROM truth", truth=truth)


@pytest.mark.parametrize("name", NAMES)
def test_spark_query_modes_match_truth(spark, name):
    g = graph(name)
    pairs = query_pairs(n=g.n, n_queries=200, seed=7).values
    res = evaluate_query_modes(spark, chl(name), rank_of(name), 8, pairs)
    truth = ground_truth_pairs(g, pairs.tolist())["dist"].values
    for mode in ("QLSN", "QFDL", "QDOL"):
        assert np.array_equal(res[mode]["answers"], truth), mode
        assert res[mode]["throughput_qps"] > 0
        assert res[mode]["latency_s"] > 0


def test_graph_edges_dataframe_matches_csr(spark):
    name = "SKIT"
    df = graph_edges(spark, name, scale=TEST_SCALE)
    g = graph(name)
    assert df.count() == g.m
    # weight totals agree between the DataFrame and CSR forms (via DuckDB)
    from pyspark.sql import functions as F

    agg = df.agg(
        F.count("*").alias("m"), F.sum("w").cast("long").alias("tw")
    )
    assert_equivalent(
        agg,
        "SELECT COUNT(*) AS m, SUM(w)::BIGINT AS tw FROM edges",
        edges=g.edge_pandas(),
    )
