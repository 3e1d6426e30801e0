"""T7 benchmark (§VI-B in-text): patterns-examined gain of the optimized
algorithms — the benchmark times the optimized run and records the gain
over the baseline in ``extra_info`` (paper: 29–57%)."""
import pytest

from repro.core.bounds import paper_default_global, PropSpec
from repro.experiments.runner import run_algorithm
from benchmarks._bench_common import BENCH_ATTRS


@pytest.mark.parametrize("dataset", ["student", "compas", "german"])
@pytest.mark.parametrize("problem", ["global", "prop"])
def test_examined_gain(benchmark, datasets, dataset, problem):
    view = datasets[dataset].with_attrs(BENCH_ATTRS)
    spec = paper_default_global() if problem == "global" else PropSpec(0.8)
    base = run_algorithm(
        view.spark_store(), problem, "baseline", spec, 50, 10, 49
    )

    def setup():
        return (view.spark_store(),), {}

    def target(store):
        return run_algorithm(store, problem, "optimized", spec, 50, 10, 49)

    out = benchmark.pedantic(target, setup=setup, rounds=1, iterations=1)
    assert out.res == base.res
    gain = 1.0 - out.examined / base.examined
    benchmark.extra_info["examined_gain_pct"] = round(100 * gain, 2)
    assert gain > 0, "optimized must examine fewer patterns than ITERTD"
