"""Benchmark: Table 7 (TWCS with size/oracle stratification)."""
from benchmarks._util import run_once, save
from repro.tables import table7
from repro.tables.common import n_trials


def test_table7(benchmark):
    rows = run_once(benchmark, lambda: table7.compute(movie_sf=1.0, trials=n_trials(300)))
    assert len(rows) == 12
    save("table7", table7.table_text(rows))
