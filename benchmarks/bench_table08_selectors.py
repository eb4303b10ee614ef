"""Table 8: seven example-selection strategies.

The heavy lifting (AL runs) is disk-cached; the benchmark measures the
table-harness end-to-end time and emits paper-vs-measured rows to
bench_results/table08.{txt,md}.
"""
from repro.exp.report import emit
from repro.exp.tables import table8


def test_table08(benchmark, bench_runner, results_dir):
    result = benchmark.pedantic(lambda: table8(bench_runner), rounds=1, iterations=1)
    assert result["rows"]
    emit(results_dir, 8, result)
