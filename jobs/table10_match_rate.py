"""spark-submit entrypoint — Fig 10b: throughput vs match rate (single-threaded).

Usage: ``spark-submit jobs/table10_match_rate.py`` (or ``python jobs/table10_match_rate.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table10_match_rate",
        'Fig 10b: throughput vs match rate (single-threaded)',
        tables_single.table_match_rate,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table10_match_rate"))


if __name__ == "__main__":
    main()
