"""Table 9: per-operation wall time in the last AL round.

The heavy lifting (AL runs) is disk-cached; the benchmark measures the
table-harness end-to-end time and emits paper-vs-measured rows to
bench_results/table09.{txt,md}.
"""
from repro.exp.report import emit
from repro.exp.tables import table9


def test_table09(benchmark, bench_runner, results_dir):
    result = benchmark.pedantic(lambda: table9(bench_runner), rounds=1, iterations=1)
    assert result["rows"]
    emit(results_dir, 9, result)
