"""Evaluation harnesses: effectiveness metrics (Fig. 6 / Fig. 10) and
table/report helpers for the paper's evaluation section."""
