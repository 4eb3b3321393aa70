"""Benchmarks for Figure 7: per-iteration time on real-world stand-ins."""
import pytest

from repro.core.config import PTuckerConfig
from repro.core.ptucker import factorize as factorize_ptucker
from repro.experiments.fig7_realworld import datasets
from repro.tensor.spark_tensor import ModePartitionedTensor


@pytest.fixture(scope="module")
def standins(spark):
    built = []
    for name, tensor, ranks in datasets(scale=0.25):
        built.append(
            (name, tensor, ranks, ModePartitionedTensor(tensor.to_spark(spark), tensor.shape))
        )
    yield built
    for _, _, _, mpt in built:
        mpt.unpersist()


@pytest.mark.parametrize("ds_index", [0, 1, 2, 3])
def test_fig7_ptucker_iteration(benchmark, spark, standins, ds_index):
    name, tensor, ranks, mpt = standins[ds_index]
    cfg = PTuckerConfig(ranks=ranks, max_iters=1, tol=0.0)
    benchmark.extra_info["dataset"] = name
    benchmark.extra_info["nnz"] = tensor.nnz
    benchmark.pedantic(
        lambda: factorize_ptucker(spark, mpt, tensor.shape, cfg),
        rounds=1,
        iterations=1,
    )
