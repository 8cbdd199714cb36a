"""Eval-I (Figures 8–10): LocalSearch-P vs OnlineAll vs Forward,
plus the §3.1 locality claim. Optional --spark adds the distributed run.

    python jobs/eval1_global.py [--scale 1.0] [--spark]
"""
from _util import base_parser, get_spark


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--spark", action="store_true")
    args = p.parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.datasets import ALL
    from repro.evalx.harness import fmt_rows

    names = args.names or ALL
    rows, cols = E.eval1_vary_k(names=names, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-I / Figure 8 — vary k (γ=10)"))
    rows, cols = E.eval1_vary_gamma(names=names, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-I / Figure 9 — vary γ (k=10)"))
    rows, cols = E.locality(names=names, scale=args.scale)
    print(fmt_rows(rows, cols, title="§3.1 locality: size(G≥τ*)/size(G), k=10 γ=10"))
    if args.spark:
        spark = get_spark()
        rows, cols = E.eval1_spark(spark)
        print(fmt_rows(rows, cols, title="Eval-I — distributed engine (subset)"))


if __name__ == "__main__":
    main()
