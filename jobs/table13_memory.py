"""spark-submit entrypoint — Fig 11a: memory footprint PIM vs B+.

Usage: ``spark-submit jobs/table13_memory.py`` (or ``python jobs/table13_memory.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table13_memory",
        'Fig 11a: memory footprint PIM vs B+',
        tables_single.table_memory_footprint,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table13_memory"))


if __name__ == "__main__":
    main()
