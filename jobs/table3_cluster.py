"""T3 (paper Fig. 13) — 'cluster' execution: the paper's 20× replicated
confusion dataset (320 M objects on 9 nodes) scaled to a 20× comma-path
replication on all local cores, same four systems and three queries.

    spark-submit jobs/table3_cluster.py --base-n 50000 --factor 20
"""
from __future__ import annotations

from _common import base_parser, emit, session

from repro.workloads.experiments import SYSTEMS, t3_cluster
from repro.workloads.harness import format_table


def main(argv=None) -> None:
    p = base_parser(__doc__)
    p.add_argument("--base-n", type=int, default=50_000)
    p.add_argument("--factor", type=int, default=20)
    p.add_argument("--systems", nargs="+", default=list(SYSTEMS))
    args = p.parse_args(argv)
    spark = session("repro-t3")
    rows = t3_cluster(
        spark, args.workdir, base_n=args.base_n, factor=args.factor,
        systems=tuple(args.systems),
    )
    emit(format_table(
        f"T3 (Fig. 13) — cluster-style run, {args.factor}x replication", rows
    ))


if __name__ == "__main__":
    main()
