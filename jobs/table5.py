"""Reproduce Table 5: ablation analysis of the three ZeroER innovations.

Usage: spark-submit jobs/table5.py [--scale 1.0] [--datasets FZ DA]
"""
import sys

sys.path.insert(0, "jobs")
from _common import parse_args, session  # noqa: E402

from repro.experiments import table5  # noqa: E402

if __name__ == "__main__":
    args = parse_args(__doc__)
    spark = session("table5")
    df = table5.run(spark, scale=args.scale, datasets=args.datasets)
    print(df.to_string(index=False))
    print()
    print(table5.pivot(df).to_string())
    spark.stop()
