"""Entrypoint for Table 7 (TWCS with stratification)."""
from repro.tables import table7

if __name__ == "__main__":
    rows = table7.compute()
    print(table7.table_text(rows))
