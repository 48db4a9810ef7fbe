"""spark-submit entrypoint — Fig 10a: single-threaded B+ vs IM vs PIM.

Usage: ``spark-submit jobs/table09_single_threaded.py`` (or ``python jobs/table09_single_threaded.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table09_single_threaded",
        'Fig 10a: single-threaded B+ vs IM vs PIM',
        tables_single.table_single_threaded_compare,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table09_single_threaded"))


if __name__ == "__main__":
    main()
