"""Fig. 9(a) recall + Fig. 9(b) query-time table — K sweep over all algorithms.

Usage: python jobs/fig9_k_sweep.py [--ks 10 25 50 ...] [--gb 400]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import base_parser, emit, resolve_workdir  # noqa: E402

from repro.harness.experiments import run_k_sweep  # noqa: E402
from repro.harness.session import get_spark  # noqa: E402
from repro.harness.tables import render_table  # noqa: E402


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--ks", type=int, nargs="+", default=[10, 25, 50, 100, 200, 400])
    p.add_argument("--gb", type=int, default=400)
    args = p.parse_args()
    spark = get_spark("fig9")
    rows = run_k_sweep(spark, resolve_workdir(args), gb=args.gb, ks=args.ks,
                       n_queries=args.queries)
    emit(rows, args, render_table(
        rows, ["k", "system", "query_s", "recall", "partitions"],
        "Fig. 9 — query execution under various K (9(b) is the query_s column)"))
    spark.stop()


if __name__ == "__main__":
    main()
