"""Figure 5 — multi-attribute RFANN (conjunctive two-range predicates,
expected fraction 2^-2 per attribute) on the two-attribute datasets:
iRangeGraph+ (probabilistic p = exp(-t) visits), iRangeGraph (plain
Post-filtering on attribute 2), 2DSegmentGraph, Milvus, Pre-filtering.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = get_spark()
    from repro.eval.datasets import SPECS, load_dataset
    from repro.eval.experiments import build_suite, run_fig5

    names = args.datasets or [
        n for n in SPECS if SPECS[n][3] is not None  # two-attribute sets
    ]
    all_results = {}
    for name in names:
        ds = load_dataset(spark, name, n=args.n, nq=args.nq, seed=args.seed)
        suite = build_suite(spark, ds)
        res = run_fig5(spark, suite, nq=args.nq, seed=args.seed)
        all_results[name] = res
        print_matrix(
            f"Fig 5 multi-attribute [{name}]",
            {
                m: {
                    "qps@0.9": r["qps@0.9"],
                    "dists@0.9": r["dists@0.9"],
                    "max_recall": round(r["max_recall"], 3),
                }
                for m, r in res["methods"].items()
            },
        )
    dump("fig5_multi_attr", all_results)
    spark.stop()


if __name__ == "__main__":
    main()
