"""spark-submit entrypoint for Table 4 (SRS vs TWCS cost on MOVIE)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import get_session  # noqa: E402

from repro.tables import table4  # noqa: E402

if __name__ == "__main__":
    spark = get_session("table4")
    rows = table4.compute(spark)
    print(table4.table_text(rows))
    spark.stop()
