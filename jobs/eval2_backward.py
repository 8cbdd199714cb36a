"""Eval-II (Figure 11): LocalSearch-P vs Backward.

    python jobs/eval2_backward.py [--scale 1.0]
"""
from _util import base_parser


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.datasets import SMALL
    from repro.evalx.harness import fmt_rows

    rows, cols = E.eval2_backward(names=args.names or SMALL, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-II / Figure 11 — vs Backward"))


if __name__ == "__main__":
    main()
