"""Entrypoint: query-latency comparison (Figures 8/9 shape check).

Usage: python jobs/query_latency.py [--ops 5] [--seeds 7,11]
"""
import argparse
import tempfile

from repro.experiments import latency


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--ops", type=int, default=5)
    ap.add_argument("--seeds", default="7,11")
    ap.add_argument("--shape", default="2000x50")
    args = ap.parse_args()
    shape = tuple(int(x) for x in args.shape.split("x"))
    for seed in [int(s) for s in args.seeds.split(",")]:
        df = latency.run_latency(
            tempfile.mkdtemp(prefix="lat_"),
            n_ops=args.ops,
            shape=shape,
            seed=seed,
        )
        print(f"\n=== pipeline seed {seed} ({args.ops} ops, {shape}) ===")
        print(latency.format_table(df))
        assert df["agrees"].all(), "systems disagree on query results"


if __name__ == "__main__":
    main()
