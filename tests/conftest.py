"""Make sibling test helpers importable regardless of pytest rootdir."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
