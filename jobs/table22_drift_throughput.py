"""spark-submit entrypoint — Fig 13b: throughput under distribution drift.

Usage: ``spark-submit jobs/table22_drift_throughput.py`` (or ``python jobs/table22_drift_throughput.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table22_drift_throughput",
        'Fig 13b: throughput under distribution drift',
        tables_parallel.table_drift_throughput,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table22_drift_throughput"))


if __name__ == "__main__":
    main()
