"""spark-submit entrypoint for Table I (α vs file size).

Usage: spark-submit jobs/table1_alpha.py [workdir]
Env: REPRO_TABLE1_SIZES="16,64,256[,1024,4096]"
"""
import sys

from pyspark.sql import SparkSession

from repro.experiments import table1_alpha


def main() -> None:
    spark = SparkSession.builder.appName("table1_alpha").getOrCreate()
    workdir = sys.argv[1] if len(sys.argv) > 1 else None
    rows = table1_alpha.run(workdir=workdir, spark=spark)
    print(table1_alpha.format_table(rows))


if __name__ == "__main__":
    main()
