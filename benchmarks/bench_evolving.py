"""Benchmark: the evolving-KG experiments (Sec 7.3, Figs 8-9 as rows).

Not a numbered table, but EXPERIMENTS.md records these rows as the
evolving-KG appendix; base KG at sf=0.25 of MOVIE (the paper uses the
50% subset of full MOVIE — same regime, scale-free costs).
"""
from benchmarks._util import run_once, save
from repro.tables import evolving
from repro.tables.common import n_trials


def test_evolving_single_batch(benchmark):
    rows = run_once(
        benchmark, lambda: evolving.single_batch_rows(base_sf=0.25, trials=n_trials(30))
    )
    for r in rows:
        assert float(r["SS h"]) <= float(r["Baseline h"])
    save(
        "evolving_single_batch",
        evolving.text(rows, "Fig 8 (as rows): incremental cost, single update batch"),
    )


def test_evolving_sequence(benchmark):
    rows = run_once(
        benchmark,
        lambda: evolving.sequence_rows(base_sf=0.1, n_batches=10, trials=n_trials(10)),
    )
    save(
        "evolving_sequence",
        evolving.text(rows, "Fig 9-1 (as rows): estimates over a sequence of updates"),
    )
