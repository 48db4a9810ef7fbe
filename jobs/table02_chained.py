"""spark-submit entrypoint — Fig 8b: chained index (B-chain vs IB-chain) vs chain length.

Usage: ``spark-submit jobs/table02_chained.py`` (or ``python jobs/table02_chained.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table02_chained",
        'Fig 8b: chained index (B-chain vs IB-chain) vs chain length',
        tables_single.table_chained_index,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table02_chained"))


if __name__ == "__main__":
    main()
