"""spark-submit entrypoint — Fig 8c: single-threaded PIM vs insertion depth D_I.

Usage: ``spark-submit jobs/table03_insertion_depth.py`` (or ``python jobs/table03_insertion_depth.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table03_insertion_depth",
        'Fig 8c: single-threaded PIM vs insertion depth D_I',
        tables_single.table_insertion_depth_single,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table03_insertion_depth"))


if __name__ == "__main__":
    main()
