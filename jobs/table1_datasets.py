"""Table 1 — dataset inventory (our synthetic substitutes).

Prints the substitute-dataset table mirroring the paper's Table 1 and,
as a sanity pass, materializes each dataset through the Spark
rank-mapping pipeline at the requested size.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import arg_parser, dump, get_spark, print_matrix  # noqa: E402


def main() -> None:
    args = arg_parser(__doc__).parse_args()
    spark = get_spark()
    from repro.eval.datasets import SPECS, load_dataset, table1_rows

    names = args.datasets or list(SPECS)
    rows = [r for r in table1_rows(args.n, args.nq) if r["dataset"] in names]
    checked = []
    for name in names:
        ds = load_dataset(spark, name, n=args.n, nq=args.nq, seed=args.seed)
        checked.append(
            {
                "dataset": name,
                "n": ds.n,
                "dim": ds.dim,
                "has_attr2": ds.attr2_rank is not None,
                "distinct_attr_values": int(len(set(ds.attr.tolist()))),
            }
        )
    payload = {"table1": rows, "materialized": checked}
    dump("table1_datasets", payload)
    print_matrix(
        "Table 1 (substitutes)",
        {r["dataset"]: {k: v for k, v in r.items() if k != "dataset"}
         for r in rows},
    )
    spark.stop()


if __name__ == "__main__":
    main()
