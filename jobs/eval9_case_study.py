"""Eval-IX (Figures 20–21): DBLP-like case study.

    python jobs/eval9_case_study.py
"""
from _util import base_parser


def main() -> None:
    base_parser(__doc__).parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.harness import fmt_rows

    rows, cols = E.eval9_case_study()
    print(fmt_rows(rows, cols, title="Eval-IX / Figures 20–21 — case study"))


if __name__ == "__main__":
    main()
