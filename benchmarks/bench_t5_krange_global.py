"""T5 benchmark (Fig. 8): effect of the k range on the global-bounds
algorithms — the optimized gain grows with the range (German Credit: the
mid-size dataset supports k up to 350 as in the paper)."""
import pytest

from repro.core.bounds import GlobalSpec
from repro.experiments.runner import run_algorithm
from benchmarks._bench_common import BENCH_ATTRS


@pytest.mark.parametrize("k_max", [49, 150])
@pytest.mark.parametrize("algo", ["baseline", "optimized"])
def test_krange_global(benchmark, german_full, k_max, algo):
    view = german_full.with_attrs(BENCH_ATTRS)
    spec = GlobalSpec({k: k for k in range(10, k_max + 1, 10)})

    def setup():
        return (view.spark_store(),), {}

    def target(store):
        return run_algorithm(store, "global", algo, spec, 50, 10, k_max)

    out = benchmark.pedantic(target, setup=setup, rounds=1, iterations=1)
    assert not out.timed_out
    benchmark.extra_info["examined"] = out.examined
