"""Seed-set distribution entropy (§5.1) as a Spark SQL aggregation.

The diversity of the empirical seed-set distribution from T trials is its
Shannon entropy H = −Σ_S p_S log₂ p_S; an empirical distribution from T
trials caps at log₂ T. Computed per (network, setting, alg, sample_number,
k) group directly on the trial-result DataFrame.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

GROUP = ["network", "setting", "alg", "sample_number", "k"]


def seed_set_entropy(trials: DataFrame) -> DataFrame:
    """Entropy per experiment group; columns GROUP + (trials, entropy)."""
    counts = trials.groupBy(*GROUP, "seed_set").agg(
        F.count("*").alias("cnt")
    )
    totals = counts.groupBy(*GROUP).agg(F.sum("cnt").alias("total"))
    return (
        counts.join(totals, GROUP)
        .withColumn("p", F.col("cnt") / F.col("total"))
        .groupBy(*GROUP)
        .agg(
            F.first("total").alias("trials"),
            (-F.sum(F.col("p") * F.log2("p"))).alias("entropy"),
        )
    )
