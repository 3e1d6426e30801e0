"""Benchmark fixtures: the three evaluation datasets at full paper size."""
import pytest

from repro.datasets import compas, german_credit, student


@pytest.fixture(scope="session")
def student_full(spark):
    return student(spark, n=395, seed=42)


@pytest.fixture(scope="session")
def compas_full(spark):
    return compas(spark, n=6889, seed=7)


@pytest.fixture(scope="session")
def german_full(spark):
    return german_credit(spark, n=1000, seed=11)


@pytest.fixture
def datasets(student_full, compas_full, german_full):
    return {
        "student": student_full,
        "compas": compas_full,
        "german": german_full,
    }
