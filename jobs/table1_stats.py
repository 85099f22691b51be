"""Table I job: dataset statistics via Spark aggregations.

    spark-submit jobs/table1_stats.py
"""
from _common import session

from repro.experiments import format_rows, table1


def main() -> None:
    spark = session("table1-stats")
    rows, meta = table1(spark=spark)
    print("Table I — dataset statistics (Spark degree aggregations)")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
