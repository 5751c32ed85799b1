"""Figure 4 — iRangeGraph vs Oracle-HNSW (dedicated graphs materialized
from scratch for each of the workload's distinct query ranges).

The paper's headline: the impractical oracle wins by less than 2x qps at
0.9 recall.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = get_spark()
    from repro.eval.datasets import SPECS, load_dataset
    from repro.eval.experiments import build_suite, run_fig4

    names = args.datasets or list(SPECS)
    all_results = {}
    for name in names:
        ds = load_dataset(spark, name, n=args.n, nq=args.nq, seed=args.seed)
        suite = build_suite(spark, ds)
        res = run_fig4(spark, suite, nq=args.nq, seed=args.seed)
        all_results[name] = res
        print_matrix(
            f"Fig 4 oracle gap [{name}]",
            {
                m: {"qps@0.9": r["qps@0.9"], "dists@0.9": r["dists@0.9"]}
                for m, r in res["methods"].items()
            },
        )
    dump("fig4_oracle", all_results)
    spark.stop()


if __name__ == "__main__":
    main()
