"""Render results/run_all.json into markdown tables (helper for
EXPERIMENTS.md). Prints to stdout; paste/curate into EXPERIMENTS.md.
"""
import json
import sys
from pathlib import Path

RESULTS = Path(__file__).resolve().parent.parent / "results"


def fmt(v, digits=3):
    if v is None:
        return "—"
    if isinstance(v, float):
        if v >= 100:
            return f"{v:,.0f}"
        return f"{v:.{digits}g}"
    return str(v)


def md_table(rows: dict[str, dict[str, object]], col_order=None) -> str:
    cols = col_order or sorted({c for r in rows.values() for c in r})
    out = ["| | " + " | ".join(cols) + " |",
           "|---" * (len(cols) + 1) + "|"]
    for name, r in rows.items():
        out.append(
            f"| {name} | " + " | ".join(fmt(r.get(c)) for c in cols) + " |"
        )
    return "\n".join(out)


def main() -> None:
    data = json.loads((RESULTS / "run_all.json").read_text())
    datasets = list(data["table2"].keys())

    print("## Table 2 (measured, MiB)\n")
    t2 = {}
    for d in datasets:
        for m, v in data["table2"][d]["footprint_mb"].items():
            t2.setdefault(m, {})[d] = v
    print(md_table(t2, datasets))

    print("\n## Table 3 (measured, s)\n")
    t3 = {}
    for d in datasets:
        sec = data["table3"][d]["seconds"]
        for m, v in sec.items():
            t3.setdefault(m, {})[d] = v
        t3.setdefault("HNSW (reference)", {})[d] = data["table3"][d][
            "hnsw_reference_seconds"]
        t3.setdefault("iRangeGraph (driver-local)", {})[d] = data["table3"][
            d].get("irange_local_seconds")
    print(md_table(t3, datasets))
    ratios = {d: fmt(data["table3"][d].get("irange_local_over_hnsw"))
              for d in datasets}
    print(f"\niRangeGraph(local)/HNSW build ratio: {ratios}")

    for wname in ("mixed", "large", "moderate", "small"):
        print(f"\n## Figure 2 — {wname} workload: "
              "qps@0.9 | dists@0.9 | max recall\n")
        rows = {}
        for d in datasets:
            per = data["fig2"][d]["workloads"][wname]
            for m, r in per.items():
                rows.setdefault(m, {})[d] = (
                    f"{fmt(r['qps@0.9'])} / {fmt(r['dists@0.9'])} / "
                    f"{fmt(round(r['max_recall'], 2))}"
                )
        print(md_table(rows, datasets))

    print("\n## Figure 3 — ablation (mixed): qps@0.9 / dists@0.9\n")
    rows = {}
    for d in datasets:
        for m, r in data["fig3"][d]["variants"].items():
            rows.setdefault(m, {})[d] = (
                f"{fmt(r['qps@0.9'])} / {fmt(r['dists@0.9'])}"
            )
    print(md_table(rows, datasets))

    print("\n## Figure 4 — oracle gap: qps@0.9 / dists@0.9\n")
    rows = {}
    for d in datasets:
        for m, r in data["fig4"][d]["methods"].items():
            rows.setdefault(m, {})[d] = (
                f"{fmt(r['qps@0.9'])} / {fmt(r['dists@0.9'])}"
            )
    print(md_table(rows, datasets))
    for d in datasets:
        ms = data["fig4"][d]["methods"]
        a, b = ms["Oracle-HNSW"]["dists@0.9"], ms["iRangeGraph"]["dists@0.9"]
        if a and b:
            print(f"- {d}: ours/oracle distance ratio = {b / a:.2f}")

    if data.get("fig5"):
        print("\n## Figure 5 — multi-attribute: "
              "qps@0.9 / dists@0.9 / max recall\n")
        rows = {}
        f5sets = list(data["fig5"].keys())
        for d in f5sets:
            for m, r in data["fig5"][d]["methods"].items():
                rows.setdefault(m, {})[d] = (
                    f"{fmt(r['qps@0.9'])} / {fmt(r['dists@0.9'])} / "
                    f"{fmt(round(r['max_recall'], 2))}"
                )
        print(md_table(rows, f5sets))

    if data.get("scalability"):
        print("\n## Scalability (redcaps_lite)\n")
        rows = {str(r["n"]): {k: v for k, v in r.items() if k != "n"}
                for r in data["scalability"]}
        print(md_table(rows))


if __name__ == "__main__":
    main()
