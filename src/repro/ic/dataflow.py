"""Pure DataFrame-API implementations of the IC sampling primitives.

These are the distributed-dataflow reference jobs: live-edge sampling, the
iterative-join BFS for forward reachability, and reverse-reachable set
membership. Coins are deterministic ``xxhash64`` functions of (edge, salt)
so a job is reproducible and a lost task recomputes identical randomness —
the property a production Spark sampler needs (Spark's ``rand()`` does not
guarantee it across task retries with shuffles upstream).

The local kernels in :mod:`repro.ic` are verified against these jobs in
tests (exact equality given the same live graph; statistical equality over
seeds). The RR influence oracle build (:mod:`repro.experiments.rr_oracle`)
uses :func:`rr_membership` semantics via ``mapInPandas`` for throughput.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_MOD = 1_000_000_007


def _coin(*cols) -> F.Column:
    """Deterministic uniform-ish [0,1) coin from hashed columns."""
    return F.pmod(F.xxhash64(*cols), F.lit(_MOD)) / F.lit(float(_MOD))


def sample_live_edges(influence: DataFrame, salt: int) -> DataFrame:
    """Keep each edge with probability p — one random graph G ~ 𝒢.

    Different ``salt`` values give independent graphs.
    """
    return influence.where(
        _coin("src", "dst", F.lit(salt)) < F.col("p")
    ).select("src", "dst")


def reachable(
    live_edges: DataFrame, seeds: DataFrame, max_iters: int = 10_000
) -> DataFrame:
    """Multi-source reachability via iterative frontier joins.

    ``seeds`` has columns (id, v): independent queries keyed by ``id`` run
    together in one dataflow. Returns the visited set as (id, v).
    """
    edges = live_edges.select(
        F.col("src").alias("v"), F.col("dst").alias("nxt")
    ).cache()
    visited = seeds.select("id", "v").distinct().localCheckpoint()
    frontier = visited
    for _ in range(max_iters):
        expanded = (
            frontier.join(edges, "v")
            .select("id", F.col("nxt").alias("v"))
            .distinct()
        )
        new = expanded.join(visited, ["id", "v"], "left_anti").localCheckpoint()
        if new.rdd.isEmpty():
            break
        visited = visited.union(new).localCheckpoint()
        frontier = new
    edges.unpersist()
    return visited


def rr_membership(
    influence: DataFrame,
    targets: DataFrame,
    salt: int,
    max_iters: int = 10_000,
) -> DataFrame:
    """RR-set membership (rr_id, v) for targets (rr_id, target).

    Reverse BFS: when a vertex v is visited in RR set r, each in-edge (u, v)
    is examined with an independent coin hashed from (r, u, v, salt); success
    visits u. Each (edge, rr set) pair is examined at most once — v enters
    the frontier of r at most once — so coins are IC-faithful.
    """
    in_edges = influence.select(
        F.col("dst").alias("v"), F.col("src").alias("prev"), "p"
    ).cache()
    visited = (
        targets.select("rr_id", F.col("target").alias("v"))
        .distinct()
        .localCheckpoint()
    )
    frontier = visited
    for _ in range(max_iters):
        expanded = (
            frontier.join(in_edges, "v")
            .where(_coin("rr_id", "prev", "v", F.lit(salt)) < F.col("p"))
            .select("rr_id", F.col("prev").alias("v"))
            .distinct()
        )
        new = expanded.join(
            visited, ["rr_id", "v"], "left_anti"
        ).localCheckpoint()
        if new.rdd.isEmpty():
            break
        visited = visited.union(new).localCheckpoint()
        frontier = new
    in_edges.unpersist()
    return visited
