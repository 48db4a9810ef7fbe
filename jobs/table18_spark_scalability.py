"""spark-submit entrypoint — Fig 12a cross-check: real multicore speedup via Spark.

Usage: ``spark-submit jobs/table18_spark_scalability.py`` (or ``python jobs/table18_spark_scalability.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table18_spark_scalability",
        'Fig 12a cross-check: real multicore speedup via Spark',
        tables_parallel.table_spark_scalability,
        needs_spark=True,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table18_spark_scalability"))


if __name__ == "__main__":
    main()
