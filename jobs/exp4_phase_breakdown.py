"""Exp-4 (Fig 8): per-phase response time of VUG."""
from _common import emit, get_spark, make_parser, parse_scale

from repro.experiments.paper_numbers import PAPER_QUOTES
from repro.experiments.perf import EXP4_COLUMNS, exp4_rows


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = None if args.local else get_spark("exp4")
    rows = exp4_rows(
        spark,
        scale=parse_scale(args.scale),
        n_queries=args.queries,
        seed=args.seed,
        keys=args.keys,
    )
    emit(
        "exp4_phase_breakdown",
        "Exp-4 — per-phase time of VUG (s)",
        rows,
        EXP4_COLUMNS,
        paper_notes=PAPER_QUOTES["exp4"],
    )


if __name__ == "__main__":
    main()
