"""spark-submit entrypoint — Fig 9c: single-threaded IM-Tree vs merge ratio.

Usage: ``spark-submit jobs/table07_merge_ratio_im.py`` (or ``python jobs/table07_merge_ratio_im.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table07_merge_ratio_im",
        'Fig 9c: single-threaded IM-Tree vs merge ratio',
        lambda scale: tables_single.table_merge_ratio_single("im", scale),
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table07_merge_ratio_im"))


if __name__ == "__main__":
    main()
