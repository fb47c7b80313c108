"""spark-submit entrypoint: reproduce Table VII (compression sizes).

Usage: spark-submit jobs/table7_compression.py [--scale bench|test] [--out DIR]
"""
import argparse
import tempfile
from pathlib import Path

from pyspark.sql import SparkSession

from repro.experiments import table7


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["test", "bench"])
    ap.add_argument("--out", default=None)
    args = ap.parse_args()
    spark = (
        SparkSession.builder.appName("table7")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    out = Path(args.out) if args.out else Path(tempfile.mkdtemp(prefix="table7_"))
    df = table7.run_table7(out, scale=args.scale, spark=spark)
    print(table7.format_table(df))
    csv = out / "table7.csv"
    df.to_csv(csv, index=False)
    print(f"\nwritten: {csv}")
    spark.stop()


if __name__ == "__main__":
    main()
