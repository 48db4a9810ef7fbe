"""spark-submit entrypoint — Fig 8d: parallel PIM vs insertion depth D_I.

Usage: ``spark-submit jobs/table04_insertion_depth_par.py`` (or ``python jobs/table04_insertion_depth_par.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table04_insertion_depth_par",
        'Fig 8d: parallel PIM vs insertion depth D_I',
        tables_parallel.table_insertion_depth_parallel,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table04_insertion_depth_par"))


if __name__ == "__main__":
    main()
