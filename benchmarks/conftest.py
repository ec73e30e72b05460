"""Benchmark-local fixtures: jobs on sys.path + shared small graphs."""
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(os.path.dirname(__file__)), "jobs")
if JOBS_DIR not in sys.path:
    sys.path.insert(0, JOBS_DIR)


@pytest.fixture(scope="session")
def karate_uc01(spark):
    from repro.experiments.tables import cached_graph

    return cached_graph(spark, "Karate", "UC_0.1")


@pytest.fixture(scope="session")
def ba_s_iwc(spark):
    from repro.experiments.tables import cached_graph

    return cached_graph(spark, "BA_s", "IWC")
