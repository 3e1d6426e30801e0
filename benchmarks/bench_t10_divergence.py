"""T10 benchmark (§VI-D): the divergence baseline's cube aggregation on
the Student case-study configuration."""
from repro.divergence import divergence_subgroups


def test_divergence_cube(benchmark, student_full):
    def target():
        return divergence_subgroups(
            student_full.df, student_full.pattern_attrs[:4], k=10,
            min_support=50 / student_full.n,
        )

    out = benchmark.pedantic(target, rounds=1, iterations=1)
    assert len(out) >= 5
