"""spark-submit entrypoint — Fig 12c: self-join single vs multithreaded.

Usage: ``spark-submit jobs/table20_selfjoin.py`` (or ``python jobs/table20_selfjoin.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table20_selfjoin",
        'Fig 12c: self-join single vs multithreaded',
        tables_parallel.table_selfjoin,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table20_selfjoin"))


if __name__ == "__main__":
    main()
