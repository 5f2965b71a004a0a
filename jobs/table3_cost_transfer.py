"""Reproduce Table 3: robustness of the cost model across datasets.

Rows: dataset the cost model's weights were calibrated on; columns:
dataset whose layout was learned with that model. The paper reports the
off-diagonal penalty is usually < 10%.

Usage: ``python jobs/table3_cost_transfer.py [--scale bench|test]``
"""
import argparse

from repro.harness.tables import format_matrix, table3


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", choices=("bench", "test"), default="bench")
    ap.add_argument("--train", type=int, default=60)
    ap.add_argument("--test", type=int, default=60)
    args = ap.parse_args()
    res = table3(scale=args.scale, n_train=args.train, n_test=args.test)
    print("query time (ms); rows = model trained on, cols = layout learned for")
    print(format_matrix(res))
    diag = {c: res[c][c] for c in res}
    print("\noff-diagonal penalty vs diagonal:")
    for r in res:
        cells = [
            f"{(res[r][c] / diag[c] - 1) * 100:+.0f}%" if c != r else "--"
            for c in res
        ]
        print(f"{r:<12}" + "".join(f"{c:>12}" for c in cells))


if __name__ == "__main__":
    main()
