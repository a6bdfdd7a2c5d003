"""Regenerate Table I (dataset statistics + default parameters).

Run: ``spark-submit jobs/table1.py`` (or ``python jobs/table1.py``).
"""
from pyspark.sql import SparkSession

from repro.experiments import table1
from repro.experiments.runner import format_table

COLUMNS = [
    "dataset", "paper_dataset", "U", "V", "E", "density",
    "alpha_s", "beta_s", "alpha_b", "beta_b", "delta", "theta",
    "paper_U", "paper_V", "paper_E", "paper_density",
]


def main(spark: SparkSession) -> list[dict]:
    rows = table1.rows(spark)
    print(format_table(rows, COLUMNS))
    return rows


if __name__ == "__main__":
    session = SparkSession.builder.appName("repro-table1").getOrCreate()
    try:
        main(session)
    finally:
        session.stop()
