"""Fig. 8 — index construction time + global index size per dataset/size.

The build columns of the Fig. 7 runs; exposed as its own entrypoint to
match the paper's figure numbering.

Usage: python jobs/fig8_index_eval.py [--sweep datasets|size]
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import base_parser, emit, resolve_workdir  # noqa: E402

from repro.harness.experiments import run_dataset_eval, run_size_sweep  # noqa: E402
from repro.harness.session import get_spark  # noqa: E402
from repro.harness.tables import render_table  # noqa: E402


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--sweep", choices=["datasets", "size"], default="datasets")
    p.add_argument("--gbs", type=int, nargs="+", default=[200, 400, 600, 800, 1000])
    args = p.parse_args()
    spark = get_spark("fig8")
    wd = resolve_workdir(args)
    if args.sweep == "datasets":
        rows = run_dataset_eval(spark, wd, k=args.k, n_queries=max(2, args.queries // 5))
        cols = ["dataset", "system", "build_s", "index_bytes"]
        title = "Fig. 8(a,b) — index construction per dataset (200GB-equiv)"
    else:
        rows = run_size_sweep(spark, wd, gbs=args.gbs, k=args.k,
                              n_queries=max(2, args.queries // 5))
        cols = ["gb", "system", "build_s", "index_bytes"]
        title = "Fig. 8(c,d) — index construction, RandomWalk size sweep"
    rows = [r for r in rows if r["system"] != "Dss"]  # Dss builds no index
    emit(rows, args, render_table(rows, cols, title))
    spark.stop()


if __name__ == "__main__":
    main()
