"""Entrypoint for the evolving-KG experiments (Sec 7.3, Figs 8-9)."""
from repro.tables import evolving

if __name__ == "__main__":
    rows = evolving.single_batch_rows()
    print(evolving.text(rows, "Fig 8 (as rows): incremental cost, single update batch"))
    rows = evolving.sequence_rows()
    print(evolving.text(rows, "Fig 9-1 (as rows): estimates over a sequence of updates"))
    rows = evolving.sequence_rows(corrupt=0.75)
    print(
        evolving.text(
            rows, "Fig 9-2/3 (as rows): recovery from a corrupted base estimate (75%)"
        )
    )
