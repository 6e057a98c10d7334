"""spark-submit entrypoint reproducing the paper's Table7 (see DESIGN.md §5)."""
import sys, pathlib
sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _common import emit, get_spark
from repro.experiments.table7 import run_table7

if __name__ == "__main__":
    emit("table7", run_table7(get_spark("daisy-table7")))
