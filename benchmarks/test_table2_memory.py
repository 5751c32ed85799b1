"""Table 2 benchmark: memory footprint of every index.

The timed operation is the footprint accounting sweep (cheap); the
payload is the per-method MiB table in extra_info, plus assertions on
the paper's reported ordering: SuperPostfiltering > iRangeGraph >
label/bucket methods > raw vectors (= Pre-filtering).
"""
from repro.eval.experiments import run_table2
from repro.eval.memory import footprint_mb


def test_table2_memory_footprint(benchmark, bench_suite):
    res = benchmark.pedantic(
        lambda: run_table2(bench_suite), rounds=3, iterations=1
    )
    mb = res["footprint_mb"]
    benchmark.extra_info["footprint_mb"] = {
        k: round(v, 3) for k, v in mb.items()
    }
    # Paper Table 2 shape: SuperPostfiltering's overlapping windows cost
    # more than iRangeGraph's log-layer index, which costs more than a
    # single-graph / bucket method, which costs more than raw vectors.
    assert mb["SuperPostfiltering"] > mb["iRangeGraph"]
    assert mb["iRangeGraph"] > mb["Milvus"]
    assert mb["Milvus"] >= mb["raw vectors"]
    assert mb["Pre-filtering"] == mb["raw vectors"]


def test_table2_irange_index_is_log_layers(bench_suite):
    """iRangeGraph index bytes == num_layers x one padded adjacency."""
    idx = bench_suite.indexes["iRangeGraph"]
    per_layer = idx.n * idx.m * 4
    assert idx.memory_bytes()["index"] == idx.tree.num_layers * per_layer


def test_table2_footprint_includes_vectors(bench_suite, bench_ds):
    for name, index in bench_suite.indexes.items():
        mem = index.memory_bytes()
        assert mem["vectors"] == bench_ds.vectors.nbytes, name
        assert footprint_mb(mem) >= mem["vectors"] / (1 << 20)
