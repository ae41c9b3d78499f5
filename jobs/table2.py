"""Reproduce Table 2: dataset characteristics.

Usage: spark-submit jobs/table2.py [--scale 1.0]
"""
import sys

sys.path.insert(0, "jobs")
from _common import parse_args, session  # noqa: E402

from repro.experiments import table2  # noqa: E402

if __name__ == "__main__":
    args = parse_args(__doc__)
    spark = session("table2")
    print(table2.run(spark, scale=args.scale).to_string(index=False))
    spark.stop()
