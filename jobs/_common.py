"""Shared helpers for spark-submit job entry points."""
from __future__ import annotations

import argparse
import os
import sys

# Allow running `python jobs/<name>.py` without installing the package.
sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))


def get_spark(app: str):
    """Session for spark-submit / plain-python invocation (tests pass
    their own session to the underlying run() functions instead)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = SparkSession.builder.appName(app).getOrCreate()
    s.sparkContext.setLogLevel("ERROR")
    return s


def base_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--n-objects", type=int, default=5000, help="dataset rows to synthesise")
    p.add_argument("--chunk-size", type=int, default=500, help="client chunk size")
    p.add_argument("--seed", type=int, default=7)
    p.add_argument("--no-spark", action="store_true", help="use the driver-side scanner instead of the Spark ciao DataSource")
    p.add_argument("--workdir", default=None, help="store directory (default: temp)")
    return p


def print_table(title: str, rows: list[dict]) -> None:
    """Render result rows as a fixed-width table on stdout."""
    print(f"\n== {title} ==")
    if not rows:
        print("(no rows)")
        return
    cols = list(rows[0].keys())
    widths = {c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows)) for c in cols}
    print("  ".join(str(c).ljust(widths[c]) for c in cols))
    for r in rows:
        print("  ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols))
