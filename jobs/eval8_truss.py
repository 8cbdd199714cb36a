"""Eval-VIII (Figure 19): influential γ-truss community search.

    python jobs/eval8_truss.py [--scale 1.0]
"""
from _util import base_parser


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.datasets import SMALL
    from repro.evalx.harness import fmt_rows

    rows, cols = E.eval8_truss(names=args.names or SMALL, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-VIII / Figure 19 — γ-truss search"))


if __name__ == "__main__":
    main()
