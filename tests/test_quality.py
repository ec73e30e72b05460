"""Table 5 analytics on synthetic trial data with known answers."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments import quality


def _mk_trials(rows):
    return pd.DataFrame(
        rows,
        columns=[
            "network", "setting", "alg", "sample_number", "k", "trial",
            "seed_set", "influence",
        ],
    )


def _spark_trials(spark, pdf):
    return spark.createDataFrame(pdf)


def test_reference_influence_takes_mode_at_max_s():
    rows = (
        [("N", "S", "ris", 1024, 1, t, "7", 9.0) for t in range(8)]
        + [("N", "S", "ris", 1024, 1, 8, "3", 5.0)]
        + [("N", "S", "ris", 2, 1, 9, "1", 2.0)]
    )
    refs = quality.reference_influence(_mk_trials(rows))
    assert refs.loc[0, "ref_seed_set"] == "7"
    assert refs.loc[0, "ref_influence"] == 9.0


def test_reference_prefers_ris():
    rows = [
        ("N", "S", "oneshot", 1024, 1, 0, "2", 4.0),
        ("N", "S", "ris", 1024, 1, 0, "9", 8.0),
    ]
    refs = quality.reference_influence(_mk_trials(rows))
    assert refs.loc[0, "ref_seed_set"] == "9"


def test_least_sample_number_basic(spark):
    # alg "a": at s=1 half the trials are near-optimal; at s=2 all are.
    rows = []
    for t in range(10):
        rows.append(("N", "S", "ris", 4, 1, t, "0", 10.0))
        rows.append(("N", "S", "a", 1, 1, t, str(t % 2), 10.0 if t % 2 else 5.0))
        rows.append(("N", "S", "a", 2, 1, t, "0", 10.0))
    trials = _spark_trials(spark, _mk_trials(rows))
    refs = quality.reference_influence(_mk_trials(rows))
    t5 = quality.least_sample_number(trials, refs)
    a_row = t5[t5["alg"] == "a"].iloc[0]
    assert a_row["least_sample_number"] == 2
    assert a_row["entropy_at_s"] == pytest.approx(0.0)


def test_least_sample_number_none_when_never_reached(spark):
    rows = [
        ("N", "S", "ris", 4, 1, t, "0", 10.0) for t in range(5)
    ] + [("N", "S", "b", 1, 1, t, "1", 1.0) for t in range(5)]
    trials = _spark_trials(spark, _mk_trials(rows))
    refs = quality.reference_influence(_mk_trials(rows))
    t5 = quality.least_sample_number(trials, refs)
    b_row = t5[t5["alg"] == "b"].iloc[0]
    assert b_row["least_sample_number"] is None or pd.isna(
        b_row["least_sample_number"]
    )


def test_near_optimal_threshold_is_95_percent(spark):
    # influence 9.5 of ref 10.0 counts; 9.4 does not.
    rows = (
        [("N", "S", "ris", 4, 1, 0, "0", 10.0)]
        + [("N", "S", "c", 1, 1, t, "1", 9.5) for t in range(5)]
        + [("N", "S", "d", 1, 1, t, "2", 9.4) for t in range(5)]
    )
    trials = _spark_trials(spark, _mk_trials(rows))
    refs = quality.reference_influence(_mk_trials(rows))
    frac = quality.near_optimal_fraction(trials, refs).toPandas()
    c = frac[frac["alg"] == "c"]["frac_near_optimal"].iloc[0]
    d = frac[frac["alg"] == "d"]["frac_near_optimal"].iloc[0]
    assert c == 1.0 and d == 0.0


def test_confidence_requires_99_percent(spark):
    # 99/100 passes, 98/100 fails.
    rows = [("N", "S", "ris", 4, 1, 0, "0", 10.0)]
    for t in range(100):
        rows.append(("N", "S", "e", 1, 1, t, "1", 10.0 if t < 99 else 1.0))
        rows.append(("N", "S", "f", 1, 1, t, "2", 10.0 if t < 98 else 1.0))
    trials = _spark_trials(spark, _mk_trials(rows))
    refs = quality.reference_influence(_mk_trials(rows))
    t5 = quality.least_sample_number(trials, refs)
    e = t5[t5["alg"] == "e"].iloc[0]
    f = t5[t5["alg"] == "f"].iloc[0]
    assert e["least_sample_number"] == 1
    assert pd.isna(f["least_sample_number"])
