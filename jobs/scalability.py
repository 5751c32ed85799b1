"""Section 5.2.3 stand-in — scalability of iRangeGraph with dataset size
(the paper's DEEP study lives in its technical report): index build
time, footprint and search cost at n in {1024, 2048, 4096, 8192}.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    p = arg_parser(__doc__)
    p.add_argument("--sizes", nargs="*", type=int,
                   default=[1024, 2048, 4096, 8192])
    args = p.parse_args()
    spark = get_spark()
    from repro.eval.experiments import run_scalability

    name = (args.datasets or ["redcaps_lite"])[0]
    rows = run_scalability(spark, name, args.sizes, nq=args.nq,
                           seed=args.seed)
    dump("scalability", {"dataset": name, "rows": rows})
    print_matrix(
        f"Scalability [{name}]",
        {str(r["n"]): {k: v for k, v in r.items() if k != "n"} for r in rows},
    )
    spark.stop()


if __name__ == "__main__":
    main()
