"""Figure 2 — single-attribute RFANN qps-recall comparison.

For each dataset and each workload (mixed, large 2^-2, moderate 2^-5,
small 2^-8), sweeps the beam size for every method and reports
qps@0.9-recall, distance-computations@0.9-recall and max recall. The
printed matrices are the tabular form of the paper's Figure-2 curves;
a missing entry (—) is the paper's "fails to achieve 0.8/0.9 recall".
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = get_spark()
    from repro.eval.datasets import SPECS, load_dataset
    from repro.eval.experiments import build_suite, run_fig2

    names = args.datasets or list(SPECS)
    all_results = {}
    for name in names:
        ds = load_dataset(spark, name, n=args.n, nq=args.nq, seed=args.seed)
        suite = build_suite(spark, ds)
        res = run_fig2(spark, suite, nq=args.nq, seed=args.seed)
        all_results[name] = res
        for wname, per_method in res["workloads"].items():
            print_matrix(
                f"Fig 2 [{name} / {wname}]",
                {
                    m: {
                        "qps@0.9": r["qps@0.9"],
                        "dists@0.9": r["dists@0.9"],
                        "max_recall": round(r["max_recall"], 3),
                    }
                    for m, r in per_method.items()
                },
            )
    dump("fig2_single_attr", all_results)
    spark.stop()


if __name__ == "__main__":
    main()
