"""T1 (paper Fig. 11) — local execution: Rumble vs raw-Spark substitute
vs Spark SQL vs PySpark RDD on the confusion dataset, three queries
(filter / group / sort), sweeping object counts.

    spark-submit jobs/table1_local.py --sizes 10000 50000 200000
"""
from __future__ import annotations

from _common import base_parser, emit, session

from repro.workloads.experiments import SYSTEMS, t1_local_engines
from repro.workloads.harness import format_table


def main(argv=None) -> None:
    p = base_parser(__doc__)
    p.add_argument("--sizes", nargs="+", type=int, default=[10_000, 50_000, 200_000])
    p.add_argument("--systems", nargs="+", default=list(SYSTEMS))
    args = p.parse_args(argv)
    spark = session("repro-t1")
    rows = t1_local_engines(
        spark, args.workdir, sizes=tuple(args.sizes), systems=tuple(args.systems)
    )
    emit(format_table("T1 (Fig. 11) — local engines, confusion dataset", rows))


if __name__ == "__main__":
    main()
