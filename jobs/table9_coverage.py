"""Entrypoint: reproduce Table IX (numpy API coverage).

Usage: python jobs/table9_coverage.py [--runs 20]
(Pure-kernel experiment; no Spark needed, runs as a plain script or via
spark-submit.)
"""
import argparse

from repro.experiments import table9


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--runs", type=int, default=20)
    args = ap.parse_args()
    df = table9.run_table9(n_runs=args.runs)
    print(table9.format_table(table9.summarize(df)))
    errs = df[df["error"]]["op"].tolist()
    print(f"\nmisprediction errors: {errs or 'none'}")


if __name__ == "__main__":
    main()
