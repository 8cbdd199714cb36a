"""Eval-III (Figure 12): LocalSearch vs LocalSearch-OA.

    python jobs/eval3_countic.py [--scale 1.0]
"""
from _util import base_parser


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.datasets import SMALL
    from repro.evalx.harness import fmt_rows

    rows, cols = E.eval3_countic(names=args.names or SMALL, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-III / Figure 12 — vs LocalSearch-OA"))


if __name__ == "__main__":
    main()
