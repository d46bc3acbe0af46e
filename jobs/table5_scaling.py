"""T5 (paper Fig. 15) — large-dataset linearity: runtime of the Reddit
filter query against dataset size via replication factors (paper: up to
400× / 21.6 B objects / 12 TB on S3; here comma-path replication).

    spark-submit jobs/table5_scaling.py --base-n 100000 --factors 1 2 4 8 16
"""
from __future__ import annotations

from _common import base_parser, emit, session

from repro.workloads.experiments import linear_fit_r2, t5_scaling
from repro.workloads.harness import format_table


def main(argv=None) -> None:
    p = base_parser(__doc__)
    p.add_argument("--base-n", type=int, default=100_000)
    p.add_argument("--factors", nargs="+", type=int, default=[1, 2, 4, 8, 16])
    args = p.parse_args(argv)
    spark = session("repro-t5")
    rows = t5_scaling(spark, args.workdir, base_n=args.base_n,
                      factors=tuple(args.factors))
    emit(format_table("T5 (Fig. 15) — scaling, reddit filter query", rows))
    r2 = linear_fit_r2([m.scale for m in rows], [m.wall_s for m in rows])
    emit(f"  linear fit R^2 = {r2:.4f} (paper: 'the curve is very linear')")


if __name__ == "__main__":
    main()
