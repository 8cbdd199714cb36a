"""Eval-V (Figures 14–15): progressive reporting latency and total time.

    python jobs/eval5_progressive.py [--scale 1.0]
"""
from _util import base_parser


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.datasets import SMALL
    from repro.evalx.harness import fmt_rows

    for name in args.names or SMALL:
        rows, cols = E.eval5_latency(name=name, scale=args.scale)
        print(fmt_rows(rows, cols,
                       title=f"Eval-V / Figure 14 — time to top-i ({name}, k=128)"))
    rows, cols = E.eval5_total(names=args.names or SMALL, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-V / Figure 15 — total time by k"))


if __name__ == "__main__":
    main()
