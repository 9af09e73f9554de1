"""Entrypoint for Table 8 (qualitative feature comparison)."""
from repro.tables import table8

if __name__ == "__main__":
    print(table8.table_text())
