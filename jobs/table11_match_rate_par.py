"""spark-submit entrypoint — Fig 10b: parallel PIM vs match rate.

Usage: ``spark-submit jobs/table11_match_rate_par.py`` (or ``python jobs/table11_match_rate_par.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table11_match_rate_par",
        'Fig 10b: parallel PIM vs match rate',
        tables_parallel.table_match_rate_parallel,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table11_match_rate_par"))


if __name__ == "__main__":
    main()
