"""Make the shared test helpers importable as ``helpers`` regardless of
pytest's import mode/rootdir resolution."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
