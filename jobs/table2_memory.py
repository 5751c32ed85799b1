"""Table 2 — memory footprint (MiB) of every method on every dataset.

Builds the full index suite per dataset and accounts vectors + index
bytes (the paper reports GB at 1M objects; our scale reports MiB — the
*ordering* across methods is the reproduced shape).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = get_spark()
    from repro.eval.datasets import SPECS, load_dataset
    from repro.eval.experiments import build_suite, run_table2

    names = args.datasets or list(SPECS)
    table: dict[str, dict[str, float]] = {}
    for name in names:
        ds = load_dataset(spark, name, n=args.n, nq=args.nq, seed=args.seed)
        suite = build_suite(spark, ds)
        res = run_table2(suite)
        for method, mb in res["footprint_mb"].items():
            table.setdefault(method, {})[name] = round(mb, 2)
    dump("table2_memory", table)
    print_matrix("Table 2: memory footprint (MiB)", table)
    spark.stop()


if __name__ == "__main__":
    main()
