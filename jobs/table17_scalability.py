"""spark-submit entrypoint — Fig 12a: scalability and CC overhead.

Usage: ``spark-submit jobs/table17_scalability.py`` (or ``python jobs/table17_scalability.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table17_scalability",
        'Fig 12a: scalability and CC overhead',
        tables_parallel.table_scalability,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table17_scalability"))


if __name__ == "__main__":
    main()
