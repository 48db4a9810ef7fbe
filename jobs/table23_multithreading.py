"""spark-submit entrypoint — Fig 13c: multithreading efficiency.

Usage: ``spark-submit jobs/table23_multithreading.py`` (or ``python jobs/table23_multithreading.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table23_multithreading",
        'Fig 13c: multithreading efficiency',
        tables_parallel.table_multithreading_efficiency,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table23_multithreading"))


if __name__ == "__main__":
    main()
