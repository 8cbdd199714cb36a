"""Eval-IV (Figure 13): sensitivity to the growth ratio δ.

    python jobs/eval4_delta.py [--scale 1.0]
"""
from _util import base_parser


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.datasets import SMALL
    from repro.evalx.harness import fmt_rows

    rows, cols = E.eval4_delta(names=args.names or SMALL, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-IV / Figure 13 — growth ratio δ"))


if __name__ == "__main__":
    main()
