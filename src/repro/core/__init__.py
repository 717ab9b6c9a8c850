"""Core contribution of the paper: cost model, optimizers, planner.

Pure-Python (numpy at most) — no Spark dependency — so the optimization
layer can be tested exhaustively and reused by both the Spark engine and
the analytic experiments.
"""
