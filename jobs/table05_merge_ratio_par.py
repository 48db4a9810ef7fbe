"""spark-submit entrypoint — Fig 9a: parallel PIM vs merge ratio.

Usage: ``spark-submit jobs/table05_merge_ratio_par.py`` (or ``python jobs/table05_merge_ratio_par.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table05_merge_ratio_par",
        'Fig 9a: parallel PIM vs merge ratio',
        tables_parallel.table_merge_ratio_parallel,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table05_merge_ratio_par"))


if __name__ == "__main__":
    main()
