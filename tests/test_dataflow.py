"""Distributed dataflow (DataFrame-join BFS) vs local kernels."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs import assign_probabilities, build_network, to_csr
from repro.ic import dataflow
from tests.helpers import ref_reachable


@pytest.fixture(scope="module")
def karate_influence(spark):
    return assign_probabilities(
        build_network(spark, "Karate"), "UC_0.1"
    ).cache()


def test_sample_live_edges_rate(spark, karate_influence):
    m = karate_influence.count()
    kept = [
        dataflow.sample_live_edges(karate_influence, salt).count()
        for salt in range(40)
    ]
    # ~Binomial(156, 0.1) per draw.
    assert 10 < np.mean(kept) < 22
    assert len(set(kept)) > 1  # different salts → different graphs


def test_sample_live_edges_deterministic(spark, karate_influence):
    a = set(
        (r.src, r.dst)
        for r in dataflow.sample_live_edges(karate_influence, 5).collect()
    )
    b = set(
        (r.src, r.dst)
        for r in dataflow.sample_live_edges(karate_influence, 5).collect()
    )
    assert a == b


def test_reachable_matches_local_bfs(spark, karate_influence):
    graph = to_csr(karate_influence)
    live = dataflow.sample_live_edges(karate_influence, 11)
    live_pairs = set((r.src, r.dst) for r in live.collect())
    src = np.repeat(np.arange(graph.n), graph.out_degree())
    eidx = np.array(
        [
            e
            for e in range(graph.m)
            if (int(src[e]), int(graph.out_dst[e])) in live_pairs
        ]
    )
    seeds = spark.createDataFrame(
        pd.DataFrame({"id": [0, 1, 2], "v": [0, 33, 16]})
    )
    got = dataflow.reachable(live, seeds).toPandas()
    for qid, s in [(0, 0), (1, 33), (2, 16)]:
        expect = ref_reachable(graph, eidx, [s])
        assert set(got.loc[got["id"] == qid, "v"]) == expect


def test_reachable_p1_full_graph(spark, karate_influence):
    all_live = karate_influence.select("src", "dst")
    seeds = spark.createDataFrame(pd.DataFrame({"id": [0], "v": [0]}))
    got = dataflow.reachable(all_live, seeds)
    assert got.count() == 34  # Karate is strongly connected when symmetric


def test_rr_membership_contains_target(spark, karate_influence):
    targets = spark.createDataFrame(
        pd.DataFrame({"rr_id": range(8), "target": [0, 4, 8, 12, 16, 20, 24, 28]})
    )
    got = dataflow.rr_membership(karate_influence, targets, salt=3).toPandas()
    for r, t in zip(range(8), [0, 4, 8, 12, 16, 20, 24, 28]):
        assert t in set(got.loc[got["rr_id"] == r, "v"])


def test_rr_membership_statistics_match_kernel(spark, karate_influence):
    # Mean RR-set size from the dataflow job ≈ kernel EPT (~2.0 on UC_0.1).
    n_sets = 300
    rng = np.random.default_rng(0)
    targets = spark.createDataFrame(
        pd.DataFrame(
            {"rr_id": range(n_sets), "target": rng.integers(0, 34, n_sets)}
        )
    )
    got = dataflow.rr_membership(karate_influence, targets, salt=9)
    mean_size = got.count() / n_sets
    from repro.ic.rr import rr_sets

    kernel = rr_sets(to_csr(karate_influence), 3000, rng)
    assert mean_size == pytest.approx(kernel.sizes.mean(), rel=0.35)


def test_rr_membership_p1_equals_ancestors(spark):
    # On a deterministic path 0→1→2, the RR set of target 2 is {0,1,2}.
    edges = spark.createDataFrame(
        pd.DataFrame({"src": [0, 1], "dst": [1, 2], "p": [1.0, 1.0]})
    )
    targets = spark.createDataFrame(pd.DataFrame({"rr_id": [0], "target": [2]}))
    got = dataflow.rr_membership(edges, targets, salt=1).toPandas()
    assert set(got["v"]) == {0, 1, 2}
