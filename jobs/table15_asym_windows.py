"""spark-submit entrypoint — Fig 11c: asymmetric window sizes (Spark wall-clock).

Usage: ``spark-submit jobs/table15_asym_windows.py`` (or ``python jobs/table15_asym_windows.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table15_asym_windows",
        'Fig 11c: asymmetric window sizes (Spark wall-clock)',
        tables_parallel.table_asymmetric_windows,
        needs_spark=True,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table15_asym_windows"))


if __name__ == "__main__":
    main()
