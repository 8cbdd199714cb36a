"""Eval-VI (Figures 16–17): semi-external LocalSearch-SE vs OnlineAll-SE.

    python jobs/eval6_semi_external.py [--scale 0.3]
"""
from _util import base_parser


def main() -> None:
    p = base_parser(__doc__)
    p.set_defaults(scale=0.3)
    args = p.parse_args()
    from repro.evalx import experiments as E
    from repro.evalx.harness import fmt_rows

    rows, cols = E.eval6_semi_external(
        names=args.names or ("arabic", "twitter"), scale=args.scale
    )
    print(fmt_rows(rows, cols,
                   title="Eval-VI / Figures 16–17 — semi-external (I/O + memory)"))


if __name__ == "__main__":
    main()
