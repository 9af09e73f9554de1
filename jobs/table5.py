"""Entrypoint for Table 5 (SRS/RCS/WCS/TWCS on static KGs).

Monte-Carlo layer only (no live Spark jobs needed once the populations
are generated), so it runs as a plain python script too.
"""
from repro.tables import table5

if __name__ == "__main__":
    rows = table5.compute()
    print(table5.table_text(rows))
