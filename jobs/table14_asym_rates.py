"""spark-submit entrypoint — Fig 11b: asymmetric input rates (Spark wall-clock).

Usage: ``spark-submit jobs/table14_asym_rates.py`` (or ``python jobs/table14_asym_rates.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_parallel
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table14_asym_rates",
        'Fig 11b: asymmetric input rates (Spark wall-clock)',
        tables_parallel.table_asymmetric_rates,
        needs_spark=True,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table14_asym_rates"))


if __name__ == "__main__":
    main()
