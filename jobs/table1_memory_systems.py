"""Table I — CLIMBER vs Odyssey vs ParlayANN-HNSW (I.C.T / Q.R.T / R.R × size).

Usage: python jobs/table1_memory_systems.py [--gbs 200 400 ...]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import base_parser, emit, resolve_workdir  # noqa: E402

from repro.harness.experiments import run_table1  # noqa: E402
from repro.harness.session import get_spark  # noqa: E402
from repro.harness.tables import render_table  # noqa: E402


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--gbs", type=int, nargs="+", default=[200, 400, 600, 800, 1000, 1500])
    args = p.parse_args()
    spark = get_spark("table1")
    rows = run_table1(
        spark, resolve_workdir(args), gbs=args.gbs, k=args.k, n_queries=args.queries
    )
    emit(rows, args, render_table(
        rows, ["gb", "system", "ict_s", "qrt_s", "recall"],
        "Table I — comparison with in-memory systems (X = capacity exceeded)"))
    spark.stop()


if __name__ == "__main__":
    main()
