"""Exp-7 (Fig 12/17): number of edges vs temporal simple paths in tspG."""
from _common import emit, get_spark, make_parser, parse_scale

from repro.experiments.paper_numbers import PAPER_QUOTES
from repro.experiments.perf import EXP7_COLUMNS, exp7_rows


def main() -> None:
    args = make_parser(__doc__).parse_args()
    spark = None if args.local else get_spark("exp7")
    rows = exp7_rows(
        spark,
        scale=parse_scale(args.scale),
        n_queries=args.queries,
        seed=args.seed,
    )
    emit(
        "exp7_paths_edges",
        "Exp-7 — #edges vs #paths in tspG",
        rows,
        EXP7_COLUMNS,
        paper_notes=PAPER_QUOTES["exp7"],
    )


if __name__ == "__main__":
    main()
