"""Table 1 benchmark: dataset generation + Spark rank-mapping pipeline.

Times the end-to-end materialization of one substitute dataset and
attaches the Table-1 inventory as extra_info.
"""
from repro.eval.datasets import load_dataset, table1_rows

from .conftest import BENCH_NQ


def test_table1_dataset_materialization(benchmark, spark):
    def make():
        return load_dataset(spark, "ytaudio_lite", n=1024, nq=BENCH_NQ,
                            seed=11)

    ds = benchmark.pedantic(make, rounds=3, iterations=1)
    assert ds.n == 1024
    benchmark.extra_info["table1"] = table1_rows(1024, BENCH_NQ)
