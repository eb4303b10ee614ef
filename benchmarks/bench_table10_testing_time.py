"""Table 10: blocking+matching time vs committee size N in {1,3,10}.

The heavy lifting (AL runs) is disk-cached; the benchmark measures the
table-harness end-to-end time and emits paper-vs-measured rows to
bench_results/table10.{txt,md}.
"""
from repro.exp.report import emit
from repro.exp.tables import table10


def test_table10(benchmark, bench_runner, results_dir):
    result = benchmark.pedantic(lambda: table10(bench_runner), rounds=1, iterations=1)
    assert result["rows"]
    emit(results_dir, 10, result)
