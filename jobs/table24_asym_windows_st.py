"""spark-submit entrypoint — Fig 11c companion: single-threaded asymmetric windows.

Usage: ``spark-submit jobs/table24_asym_windows_st.py`` (or ``python jobs/table24_asym_windows_st.py``).
"""
from pyspark.sql import DataFrame, SparkSession

from repro.bench import tables_single
from repro.bench.report import run_job


def run(spark: SparkSession, scale: str = "full") -> DataFrame:
    """The job body: compute this table and return it as a DataFrame."""
    return run_job(
        "table24_asym_windows_st",
        'Fig 11c companion: single-threaded asymmetric windows',
        tables_single.table_asymmetric_windows_single,
        needs_spark=False,
        scale=scale,
    )


def main() -> None:
    from repro.bench.report import get_spark

    run(get_spark("table24_asym_windows_st"))


if __name__ == "__main__":
    main()
