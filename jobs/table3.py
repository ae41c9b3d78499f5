"""Reproduce Table 3: F-score of all eleven methods on the five datasets.

Usage: spark-submit jobs/table3.py [--scale 1.0] [--datasets FZ DA]
"""
import sys

sys.path.insert(0, "jobs")
from _common import parse_args, session  # noqa: E402

from repro.experiments import table3  # noqa: E402

if __name__ == "__main__":
    args = parse_args(__doc__)
    spark = session("table3")
    df = table3.run(spark, scale=args.scale, datasets=args.datasets, seed=args.seed)
    print(df.to_string(index=False))
    print()
    print(table3.pivot(df).to_string())
    spark.stop()
