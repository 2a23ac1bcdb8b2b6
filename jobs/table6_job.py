"""spark-submit entrypoint for Table 6c (JOB benchmark baselines, §8.7.2).

Usage: spark-submit jobs/table6_job.py [sf]
"""
import sys

from pyspark.sql import SparkSession

from repro.bench.baselines import Table6Harness, format_table6
from repro.bench.queries_job import JOB_QUERIES
from repro.graphs.datasets import imdb_lite


def run(spark: SparkSession, sf: float = 0.2, repeats: int = 3) -> None:
    h = Table6Harness(imdb_lite(sf=sf), spark=spark)
    try:
        print(format_table6(h.run(JOB_QUERIES, repeats=repeats), "c: JOB"))
    finally:
        h.close()


if __name__ == "__main__":
    session = SparkSession.builder.appName("table6-job").getOrCreate()
    run(session, float(sys.argv[1]) if len(sys.argv) > 1 else 0.2)
    session.stop()
