"""spark-submit entrypoint for experiment E4-any-online (see DESIGN.md table index)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _util import main_for

if __name__ == "__main__":
    main_for("E4-any-online")
