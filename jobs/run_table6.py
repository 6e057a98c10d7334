"""spark-submit entrypoint reproducing the paper's Table6 (see DESIGN.md §5)."""
import sys, pathlib
sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _common import emit, get_spark
from repro.experiments.table6 import run_table6

if __name__ == "__main__":
    emit("table6", run_table6(get_spark("daisy-table6")))
