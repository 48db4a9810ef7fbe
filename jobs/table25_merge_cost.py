"""spark-submit entrypoint — Fig 14: merge cost vs element count (linearity).

Usage: ``spark-submit jobs/table25_merge_cost.py`` (or ``python jobs/table25_merge_cost.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table25_merge_cost",
        'Fig 14: merge cost vs element count (linearity)',
        tables_single.table_merge_cost,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table25_merge_cost"))


if __name__ == "__main__":
    main()
