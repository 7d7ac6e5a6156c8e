"""Exp-5 (Fig 9/10): tgTSG vs QuickUBG time, UB ratios under θ."""
from _common import emit, get_spark, make_parser, parse_scale

from repro.experiments.paper_numbers import PAPER_QUOTES
from repro.experiments.perf import EXP5_COLUMNS, exp5_rows
from repro.graph.datasets import DATASETS


def main() -> None:
    p = make_parser(__doc__)
    p.add_argument(
        "--sweep", action="store_true",
        help="also sweep θ on D9/D10 (Fig 10) instead of default-θ rows",
    )
    args = p.parse_args()
    spark = None if args.local else get_spark("exp5")
    thetas = None
    if args.sweep:
        thetas = {
            "D9": [16, 20, 24],
            "D10": [23, 25, 27],
        }
    rows = exp5_rows(
        spark,
        scale=parse_scale(args.scale),
        n_queries=args.queries,
        seed=args.seed,
        keys=args.keys,
        thetas=thetas,
    )
    emit(
        "exp5_tgtsg_vs_quickubg" + ("_sweep" if args.sweep else ""),
        "Exp-5 — tgTSG vs QuickUBG (s) and upper-bound ratios (%)",
        rows,
        EXP5_COLUMNS,
        paper_notes=PAPER_QUOTES["exp5"],
    )


if __name__ == "__main__":
    main()
