"""spark-submit entrypoint — Fig 8a: window join via NLWJ / B+-Tree / round-robin / Bw-Tree.

Usage: ``spark-submit jobs/table01_existing_approaches.py`` (or ``python jobs/table01_existing_approaches.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table01_existing_approaches",
        'Fig 8a: window join via NLWJ / B+-Tree / round-robin / Bw-Tree',
        tables_parallel.table_existing_approaches,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table01_existing_approaches"))


if __name__ == "__main__":
    main()
