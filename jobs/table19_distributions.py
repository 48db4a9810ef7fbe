"""spark-submit entrypoint — Fig 12b: skewed key distributions (Spark wall-clock).

Usage: ``spark-submit jobs/table19_distributions.py`` (or ``python jobs/table19_distributions.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table19_distributions",
        'Fig 12b: skewed key distributions (Spark wall-clock)',
        tables_parallel.table_distributions,
        needs_spark=True,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table19_distributions"))


if __name__ == "__main__":
    main()
