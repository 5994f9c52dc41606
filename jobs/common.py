"""Shared helpers for the spark-submit experiment jobs.

Each job reproduces one table of the paper's evaluation (§7) and prints
the same rows the paper reports, so `EXPERIMENTS.md` can diff them.
Every job accepts ``--sf`` (scale factor; sf=1 ≈ the paper's dataset
sizes) and ``--seed``.
"""
from __future__ import annotations

import argparse
import os

from pyspark.sql import SparkSession

# The paper sets θ=5 for AuthorList and θ=4 for the other two datasets.
THETA = {"authorlist": 5, "journaltitle": 4, "address": 4}


def get_spark(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def base_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--sf", type=float, default=0.05, help="scale factor")
    p.add_argument("--seed", type=int, default=1)
    p.add_argument(
        "--datasets",
        nargs="+",
        default=["authorlist", "address", "journaltitle"],
    )
    return p


def print_table(title: str, header: list[str], rows: list[list]) -> None:
    print(f"\n== {title} ==")
    widths = [
        max(len(str(h)), *(len(str(r[i])) for r in rows)) if rows else len(str(h))
        for i, h in enumerate(header)
    ]
    line = " | ".join(str(h).ljust(w) for h, w in zip(header, widths))
    print(line)
    print("-" * len(line))
    for r in rows:
        print(" | ".join(str(c).ljust(w) for c, w in zip(r, widths)))
