"""spark-submit entrypoint reproducing the paper's Table8 (see DESIGN.md §5)."""
import sys, pathlib
sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _common import emit, get_spark
from repro.experiments.table8 import run_table8

if __name__ == "__main__":
    emit("table8", run_table8(get_spark("daisy-table8")))
