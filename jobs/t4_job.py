#!/usr/bin/env python
"""spark-submit / python entrypoint for table T4 (see DESIGN.md)."""
import os, sys
sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))
sys.path.insert(0, os.path.dirname(__file__))
from run_all import main

if __name__ == "__main__":
    main(["t4"])
