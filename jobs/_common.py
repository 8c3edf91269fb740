"""Shared plumbing for the spark-submit entrypoints.

Each ``jobs/<name>.py`` reproduces one evaluation artifact (DESIGN.md §4):
it builds a local SparkSession, runs the matching harness function, and
prints the table rows the paper reports. Usage:

    spark-submit jobs/fig8_effectiveness.py --dataset ytube --sf 0.1
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def make_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def base_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--dataset", default="ytube", help="ytube|syn_ytube|mlens|syn_mlens")
    p.add_argument("--sf", type=float, default=0.1, help="scale factor")
    return p


def print_table(title: str, rows: list[dict]) -> None:
    """Render experiment rows as an aligned text table."""
    print(f"\n== {title} ==")
    if not rows:
        print("(no rows)")
        return
    cols = list(rows[0].keys())
    widths = {
        c: max(len(str(c)), *(len(_fmt(r[c])) for r in rows)) for c in cols
    }
    print("  ".join(str(c).ljust(widths[c]) for c in cols))
    for r in rows:
        print("  ".join(_fmt(r[c]).ljust(widths[c]) for c in cols))


def _fmt(v) -> str:
    if isinstance(v, float):
        return f"{v:.4f}"
    return str(v)
