"""Tests for the EXPERIMENTS.md table renderer."""
import importlib.util
import json
from pathlib import Path

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def _load():
    spec = importlib.util.spec_from_file_location(
        "render_experiments", JOBS / "render_experiments.py"
    )
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_fmt():
    mod = _load()
    assert mod.fmt(None) == "—"
    assert mod.fmt(1234.0) == "1,234"
    assert mod.fmt(1.23456) == "1.23"
    assert mod.fmt("x") == "x"


def test_md_table_layout():
    mod = _load()
    out = mod.md_table({"a": {"c1": 1.0, "c2": None}}, ["c1", "c2"])
    lines = out.splitlines()
    assert lines[0] == "| | c1 | c2 |"
    assert "| a | 1 | — |" in lines


def test_main_renders_fake_results(tmp_path, monkeypatch, capsys):
    mod = _load()
    curve = [{"beam": 10, "recall": 0.95, "qps": 100.0, "dists": 50.0}]
    method = {"curve": curve, "qps@0.9": 100.0, "dists@0.9": 50.0,
              "max_recall": 0.95}
    fake = {
        "table2": {"d1": {"footprint_mb": {"iRangeGraph": 1.5,
                                           "raw vectors": 1.0}}},
        "table3": {"d1": {"seconds": {"iRangeGraph": 2.0},
                          "hnsw_reference_seconds": 1.0,
                          "irange_local_seconds": 2.5,
                          "irange_local_over_hnsw": 2.5}},
        "fig2": {"d1": {"workloads": {w: {"iRangeGraph": method}
                                      for w in ("mixed", "large",
                                                "moderate", "small")}}},
        "fig3": {"d1": {"variants": {"iRangeGraph": method,
                                     "BasicSearch": method}}},
        "fig4": {"d1": {"methods": {"iRangeGraph": method,
                                    "Oracle-HNSW": method}}},
        "fig5": {"d1": {"methods": {"iRangeGraph+": method}}},
        "scalability": [{"n": 512, "build_seconds": 3.0,
                         "footprint_mb": 1.0, "qps@0.9": 10.0,
                         "dists@0.9": 5.0}],
    }
    (tmp_path / "run_all.json").write_text(json.dumps(fake))
    monkeypatch.setattr(mod, "RESULTS", tmp_path)
    mod.main()
    out = capsys.readouterr().out
    assert "## Table 2 (measured, MiB)" in out
    assert "## Figure 5" in out
    assert "distance ratio = 1.00" in out
    assert "## Scalability" in out
