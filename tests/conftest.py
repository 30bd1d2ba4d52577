"""Make the shared test helpers (tests/util.py) importable regardless of
pytest's import mode / rootdir layout."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
