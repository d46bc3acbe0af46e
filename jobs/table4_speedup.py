"""T4 (paper Fig. 14) — speedup analysis: runtime and aggregated
core-time of the highly filtering Reddit query at increasing degrees of
parallelism (paper: 1–32 executors; here: input partition counts).

    spark-submit jobs/table4_speedup.py --n 200000 --partitions 1 2 4 8 16
"""
from __future__ import annotations

from _common import base_parser, emit, session

from repro.workloads.experiments import t4_speedup
from repro.workloads.harness import format_table


def main(argv=None) -> None:
    p = base_parser(__doc__)
    p.add_argument("--n", type=int, default=400_000)
    p.add_argument("--partitions", nargs="+", type=int, default=[1, 2, 4, 8, 16])
    args = p.parse_args(argv)
    spark = session("repro-t4")
    rows = t4_speedup(
        spark, args.workdir, n=args.n, partitions=tuple(args.partitions)
    )
    emit(format_table("T4 (Fig. 14) — speedup, reddit filter query", rows))
    base = rows[0].wall_s
    for m in rows:
        emit(f"  p={m.scale:>3}: speedup x{base / m.wall_s:.2f}"
             + (f", aggregated cpu {m.cpu_s:.2f}s" if m.cpu_s is not None else ""))


if __name__ == "__main__":
    main()
