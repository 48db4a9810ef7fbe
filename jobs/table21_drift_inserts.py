"""spark-submit entrypoint — Fig 13a: insert distribution under drifting Gaussian.

Usage: ``spark-submit jobs/table21_drift_inserts.py`` (or ``python jobs/table21_drift_inserts.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table21_drift_inserts",
        'Fig 13a: insert distribution under drifting Gaussian',
        tables_single.table_drift_insert_distribution,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table21_drift_inserts"))


if __name__ == "__main__":
    main()
