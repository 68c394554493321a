"""Extract structure from an arbitrary log file with distributed
DATAMARAN and write the relational output as parquet.

Usage: spark-submit jobs/extract_log.py <input.log> <output_dir>
"""
import sys

from _common import get_spark

from repro.core.extract import Params
from repro.core.spark_ext import run_datamaran_spark
from repro.core.template import pretty


def main(argv):
    path, out_dir = argv[0], argv[1]
    spark = get_spark("extract-log")
    result, rows, tables = run_datamaran_spark(spark, path, Params())
    print("discovered structure templates:")
    for ct in result.templates:
        print(f"  type {ct.type_id}: {pretty(ct.template)}")
    for name, df in tables.items():
        df.write.mode("overwrite").parquet(f"{out_dir}/{name}")
        print(f"wrote {out_dir}/{name}: {df.count()} rows")


if __name__ == "__main__":
    main(sys.argv[1:])
