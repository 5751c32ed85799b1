"""Table 3 — indexing time (s) of every method on every dataset.

Also records the single-HNSW reference build and the iRangeGraph/HNSW
ratio — the paper's empirical Theorem-3.1 check ("no more than 3x").
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = get_spark()
    from repro.eval.datasets import SPECS, load_dataset
    from repro.eval.experiments import build_suite, run_table3

    names = args.datasets or list(SPECS)
    table: dict[str, dict[str, float]] = {}
    ratios = {}
    for name in names:
        ds = load_dataset(spark, name, n=args.n, nq=args.nq, seed=args.seed)
        suite = build_suite(spark, ds, time_local_irange=True)
        res = run_table3(suite)
        for method, s in res["seconds"].items():
            table.setdefault(method, {})[name] = round(s, 2)
        table.setdefault("HNSW (reference)", {})[name] = round(
            res["hnsw_reference_seconds"], 2
        )
        table.setdefault("iRangeGraph (local)", {})[name] = round(
            res["irange_local_seconds"], 2
        )
        ratios[name] = round(res["irange_local_over_hnsw"], 2)
    dump("table3_indexing_time", {"seconds": table,
                                  "irange_over_hnsw": ratios})
    print_matrix("Table 3: indexing time (s)", table)
    print("iRangeGraph / HNSW build ratio:", ratios)
    spark.stop()


if __name__ == "__main__":
    main()
