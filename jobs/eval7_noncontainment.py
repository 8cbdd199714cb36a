"""Eval-VII (Figure 18): non-containment queries vs Forward.

    python jobs/eval7_noncontainment.py [--scale 1.0]
"""
from _util import base_parser


def main() -> None:
    args = base_parser(__doc__).parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.datasets import SMALL
    from repro.evalx.harness import fmt_rows

    rows, cols = E.eval7_noncontainment(names=args.names or SMALL, scale=args.scale)
    print(fmt_rows(rows, cols, title="Eval-VII / Figure 18 — non-containment"))


if __name__ == "__main__":
    main()
