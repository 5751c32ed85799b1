"""Figure 3 — ablation of the core search algorithm (mixed workload):
iRangeGraph (Algorithm 1 with layer skipping) vs iRangeGraph- (no
skipping, O(m log n) edge selection) vs BasicSearch (classical
segment-tree decomposition with one independent search per segment).
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = get_spark()
    from repro.eval.datasets import SPECS, load_dataset
    from repro.eval.experiments import build_suite, run_fig3

    names = args.datasets or list(SPECS)
    all_results = {}
    for name in names:
        ds = load_dataset(spark, name, n=args.n, nq=args.nq, seed=args.seed)
        suite = build_suite(spark, ds)
        res = run_fig3(spark, suite, nq=args.nq, seed=args.seed)
        all_results[name] = res
        print_matrix(
            f"Fig 3 ablation [{name}]",
            {
                v: {"qps@0.9": r["qps@0.9"], "dists@0.9": r["dists@0.9"]}
                for v, r in res["variants"].items()
            },
        )
    dump("fig3_ablation", all_results)
    spark.stop()


if __name__ == "__main__":
    main()
