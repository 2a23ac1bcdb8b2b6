"""spark-submit entrypoint for Tables 6a/6b (LDBC IS + IC baselines, §8.7.1).

Usage: spark-submit jobs/table6_ldbc.py [sf]
"""
import sys

from pyspark.sql import SparkSession

from repro.bench.baselines import Table6Harness, format_table6
from repro.bench.queries_ldbc import IC_QUERIES, IS_QUERIES
from repro.graphs.datasets import ldbc_lite


def run(spark: SparkSession, sf: float = 0.2, repeats: int = 3) -> None:
    h = Table6Harness(ldbc_lite(sf=sf), spark=spark)
    try:
        print(format_table6(h.run(IS_QUERIES, repeats=repeats), "a: LDBC IS"))
        print()
        print(format_table6(h.run(IC_QUERIES, repeats=repeats), "b: LDBC IC"))
    finally:
        h.close()


if __name__ == "__main__":
    session = SparkSession.builder.appName("table6-ldbc").getOrCreate()
    run(session, float(sys.argv[1]) if len(sys.argv) > 1 else 0.2)
    session.stop()
