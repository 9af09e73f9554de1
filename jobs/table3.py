"""spark-submit entrypoint for Table 3 (data characteristics)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import get_session  # noqa: E402

from repro.tables import table3  # noqa: E402

if __name__ == "__main__":
    spark = get_session("table3")
    rows = table3.compute(spark)
    print(table3.table_text(rows))
    spark.stop()
