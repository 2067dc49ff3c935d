"""Benchmark helpers: run each experiment harness once under
pytest-benchmark and surface its headline numbers via extra_info."""


def run_once(benchmark, fn, **kwargs):
    """pedantic(rounds=1): the experiments are end-to-end harnesses, not
    micro-kernels — one timed round per table is what Figure timings mean."""
    return benchmark.pedantic(lambda: fn(**kwargs), rounds=1, iterations=1)
