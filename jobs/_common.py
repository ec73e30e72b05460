"""Shared plumbing for the spark-submit job entrypoints.

Jobs are thin wrappers: the logic lives in ``repro.*`` functions that take a
SparkSession. Under pytest the session fixture is used instead; here we
create (or reuse) one for spark-submit / plain-python execution.
"""
import argparse
import os
import sys

RESULTS_DIR = os.path.join(os.path.dirname(os.path.dirname(__file__)), "results")


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )


def argparser(desc: str) -> argparse.ArgumentParser:
    ap = argparse.ArgumentParser(description=desc)
    ap.add_argument("--profile", default="quick", choices=["test", "quick"])
    ap.add_argument("--out", default=None, help="optional output path")
    return ap


def emit(text: str, out: str | None) -> None:
    print(text)
    if out:
        os.makedirs(os.path.dirname(os.path.abspath(out)), exist_ok=True)
        with open(out, "w") as f:
            f.write(text + "\n")
    sys.stdout.flush()
