"""Shared runner for the ``jobs/`` entrypoints.

Each job wraps one evaluation table: it runs the full-scale generator,
prints the rows as a markdown table (the same rows EXPERIMENTS.md
records next to the paper's numbers) and writes ``results/<name>.md``.
Jobs expose ``run(spark) -> pyspark DataFrame`` so they compose like any
other Spark job, and a ``main()`` for ``spark-submit jobs/<name>.py``.
"""
from __future__ import annotations

import os
import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def get_spark(app: str) -> SparkSession:
    """Session for standalone job runs — mirrors the conftest fixture
    settings (broadcast joins off, Arrow on)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def to_markdown(pdf: pd.DataFrame) -> str:
    """Minimal GitHub-markdown table renderer (``tabulate`` is not in the
    offline environment); floats are rounded to readable precision."""

    def fmt(v) -> str:
        if isinstance(v, float):
            if v == 0:
                return "0"
            if abs(v) >= 1000:
                return f"{v:,.0f}"
            return f"{v:.4g}"
        return str(v)

    cols = list(pdf.columns)
    lines = [
        "| " + " | ".join(cols) + " |",
        "| " + " | ".join("---" for _ in cols) + " |",
    ]
    for _, row in pdf.iterrows():
        lines.append("| " + " | ".join(fmt(row[c]) for c in cols) + " |")
    return "\n".join(lines)


def run_job(
    name: str,
    title: str,
    table_fn,
    *,
    needs_spark: bool = False,
    scale: str = "full",
) -> DataFrame:
    """Execute a table generator, print + persist markdown, return the
    result as a Spark DataFrame."""
    spark = get_spark(name)
    t0 = time.perf_counter()
    pdf: pd.DataFrame = (
        table_fn(spark, scale) if needs_spark else table_fn(scale)
    )
    dt = time.perf_counter() - t0
    md = f"## {name} — {title}\n\n{to_markdown(pdf)}\n\n_generated in {dt:.1f}s_\n"
    print(md)
    out_dir = os.path.join(os.path.dirname(os.path.dirname(os.path.dirname(
        os.path.dirname(os.path.abspath(__file__))))), "results")
    os.makedirs(out_dir, exist_ok=True)
    with open(os.path.join(out_dir, f"{name}.md"), "w") as f:
        f.write(md)
    return spark.createDataFrame(pdf)
