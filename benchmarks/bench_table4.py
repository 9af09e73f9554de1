"""Benchmark: Table 4 (Spark framework runs of SRS vs TWCS(m=10) on MOVIE)."""
from benchmarks._util import run_once, save
from repro.tables import table4


def test_table4(benchmark, spark):
    rows = run_once(benchmark, lambda: table4.compute(spark, movie_sf=0.1, trials=100))
    twcs = float(rows[1]["time h (ours)"])
    srs = float(rows[0]["time h (ours)"])
    assert twcs < srs  # the table's headline: TWCS ~60% cheaper
    save("table4", table4.table_text(rows))
