"""spark-submit entrypoint — Fig 11d: effective memory bandwidth proxy.

Usage: ``spark-submit jobs/table16_bandwidth.py`` (or ``python jobs/table16_bandwidth.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table16_bandwidth",
        'Fig 11d: effective memory bandwidth proxy',
        tables_parallel.table_memory_bandwidth,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table16_bandwidth"))


if __name__ == "__main__":
    main()
