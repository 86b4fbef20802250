"""spark-submit entrypoint for table3 (see repro.experiments.tables)."""
from _common import main_for_table

if __name__ == "__main__":
    main_for_table("table3")
