"""Evaluation harness and paper-table builders (Tables 2-7)."""
