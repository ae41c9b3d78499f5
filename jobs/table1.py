"""Reproduce Table 1: cosine(S_M,S_U) vs cosine(R_M,R_U) after grouping.

Usage: spark-submit jobs/table1.py [--scale 1.0]
"""
import sys

sys.path.insert(0, "jobs")
from _common import parse_args, session  # noqa: E402

from repro.experiments import table1  # noqa: E402

if __name__ == "__main__":
    args = parse_args(__doc__)
    spark = session("table1")
    df = table1.run(spark, scale=args.scale)
    print(df.to_string(index=False))
    spark.stop()
