"""spark-submit entrypoint — Fig 9b: per-tuple step cost breakdown (us).

Usage: ``spark-submit jobs/table06_breakdown.py`` (or ``python jobs/table06_breakdown.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table06_breakdown",
        'Fig 9b: per-tuple step cost breakdown (us)',
        tables_single.table_cost_breakdown,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table06_breakdown"))


if __name__ == "__main__":
    main()
