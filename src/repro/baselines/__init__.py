"""Lite reimplementations of the paper's 7 comparison systems (§4.3).

Each module keeps the characteristic strengths and blind spots the paper
attributes to the original system, so the win/lose *shape* of Tables 5-8
is meaningful even though the originals are closed-source or need GPUs.
"""
