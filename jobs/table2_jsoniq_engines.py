"""T2 (paper Fig. 12) — JSONiq engines: Rumble vs the single-threaded
Zorba-like and Xidel-like engines, runtimes capped (paper: 600 s;
scaled here). DNF rows correspond to the paper's capped bars.

    spark-submit jobs/table2_jsoniq_engines.py --sizes 10000 50000 200000 --budget-s 60
"""
from __future__ import annotations

from _common import base_parser, emit, session

from repro.workloads.experiments import t2_jsoniq_engines
from repro.workloads.harness import format_table


def main(argv=None) -> None:
    p = base_parser(__doc__)
    p.add_argument("--sizes", nargs="+", type=int, default=[10_000, 50_000, 200_000])
    p.add_argument("--budget-s", type=float, default=60.0)
    args = p.parse_args(argv)
    spark = session("repro-t2")
    rows = t2_jsoniq_engines(
        spark, args.workdir, sizes=tuple(args.sizes), budget_s=args.budget_s
    )
    emit(format_table(
        f"T2 (Fig. 12) — JSONiq engines, cap {args.budget_s:.0f}s", rows
    ))


if __name__ == "__main__":
    main()
