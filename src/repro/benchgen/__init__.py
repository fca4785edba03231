"""Benchmark generators replacing the paper's proprietary corpora (§4.2).

The paper evaluates on web/Excel corpora that cannot be redistributed
(it, too, only releases regeneration scripts). These modules generate
tables with the same shape statistics (Table 3) over realistic string
domains that mirror every worked example in the paper, recording ground
truth at corruption time so detection/repair can be scored exactly.
"""
