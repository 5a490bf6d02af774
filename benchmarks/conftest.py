"""Shared fixtures for the table-regeneration benchmarks.

Each ``bench_table*.py`` regenerates one evaluation table at reduced
scale (SF noted in the module) under pytest-benchmark timing. Heavy
pipelines run with ``benchmark.pedantic(rounds=1)`` — these are
end-to-end table jobs, not microbenchmarks.
"""
import pytest


@pytest.fixture(scope="session")
def pretrained(spark):
    from repro.experiments import finetune

    return finetune.default_pretrained(spark, n_tables=21, seed=999)
