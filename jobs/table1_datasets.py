"""Reproduce Table 1: dataset and query characteristics.

Usage: ``python jobs/table1_datasets.py [--scale bench|test]``
(also runnable via ``spark-submit`` — no Spark session is needed for the
single-node harness, so none is created).
"""
import argparse

from repro.harness.tables import table1


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=("bench", "test"), default="bench")
    ap.add_argument("--queries", type=int, default=100)
    args = ap.parse_args()
    res = table1(scale=args.scale, n_queries=args.queries)
    hdr = f"{'':<14}" + "".join(f"{n:>12}" for n in res)
    print(hdr)
    for field in ("records", "queries", "dimensions", "size_gb", "avg_selectivity"):
        row = [res[n][field] for n in res]
        cells = "".join(
            f"{v:>12.4g}" if isinstance(v, float) else f"{v:>12}" for v in row
        )
        print(f"{field:<14}" + cells)
    print("\npaper (Table 1):")
    for field in ("records", "queries", "dimensions", "size_gb"):
        cells = "".join(f"{res[n]['paper'][field]:>12}" for n in res)
        print(f"{field:<14}" + cells)


if __name__ == "__main__":
    main()
