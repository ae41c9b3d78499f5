"""Reproduce Table 4: labels needed to match ZeroER's F-score.

Usage: spark-submit jobs/table4.py [--scale 1.0] [--datasets FZ DA]
"""
import sys

sys.path.insert(0, "jobs")
from _common import parse_args, session  # noqa: E402

from repro.experiments import table4  # noqa: E402

if __name__ == "__main__":
    args = parse_args(__doc__)
    spark = session("table4")
    df = table4.run(spark, scale=args.scale, datasets=args.datasets, seed=args.seed)
    print(df.to_string(index=False))
    spark.stop()
