"""spark-submit entrypoint reproducing the paper's Table5 (see DESIGN.md §5)."""
import sys, pathlib
sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _common import emit, get_spark
from repro.experiments.table5 import run_table5

if __name__ == "__main__":
    emit("table5", run_table5(get_spark("daisy-table5")))
