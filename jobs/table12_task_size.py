"""spark-submit entrypoint — Fig 10c/d: throughput and latency vs task size.

Usage: ``spark-submit jobs/table12_task_size.py`` (or ``python jobs/table12_task_size.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table12_task_size",
        'Fig 10c/d: throughput and latency vs task size',
        tables_parallel.table_task_size,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table12_task_size"))


if __name__ == "__main__":
    main()
