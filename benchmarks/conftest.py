"""Benchmark helpers: single-shot pedantic runs (each workload is a
full decomposition sweep; statistical repetition would multiply minutes
of runtime for no insight) and a session summary that tells the reader
where the generated tables landed."""
import pytest


@pytest.fixture
def once(benchmark):
    """Run the thunk exactly once under pytest-benchmark timing."""

    def runner(fn, *args, **kwargs):
        return benchmark.pedantic(
            fn, args=args, kwargs=kwargs, rounds=1, iterations=1, warmup_rounds=0
        )

    return runner


def pytest_terminal_summary(terminalreporter):
    terminalreporter.write_line(
        "[benchmarks] generated tables are under results/*.md (paper-vs-ours in EXPERIMENTS.md)"
    )
