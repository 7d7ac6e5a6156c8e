"""Exp-6 (Fig 11/16): EEV vs path enumeration, both on the tight graph."""
from _common import emit, get_spark, make_parser, parse_scale

from repro.experiments.paper_numbers import PAPER_QUOTES
from repro.experiments.perf import EXP6_COLUMNS, exp6_rows


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = None if args.local else get_spark("exp6")
    rows = exp6_rows(
        spark,
        scale=parse_scale(args.scale),
        n_queries=args.queries,
        seed=args.seed,
    )
    emit(
        "exp6_eev_vs_enum",
        "Exp-6 — EEV vs enumeration on Gt (s)",
        rows,
        EXP6_COLUMNS,
        paper_notes=PAPER_QUOTES["exp6"],
    )


if __name__ == "__main__":
    main()
