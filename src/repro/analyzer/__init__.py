"""Static analysis (§3.2): turn an inference query — a SQL query plus a
Python model-pipeline script — into Raven IR plans.

* ``sql_parser``: a recursive-descent parser for the SQL subset the
  paper's examples use, including the SQL Server-style
  ``PREDICT(MODEL name, cols...)`` invocation.
* ``py_analyzer``: ``ast``-based dataflow extraction from straight-line
  Python/pandas scripts, with an API knowledge base (``knowledge``),
  one plan per conditional branch, and executable UDF fallbacks for
  code it cannot map.
"""
from repro.analyzer.py_analyzer import AnalysisResult, analyze_script
from repro.analyzer.sql_parser import parse_inference_query

__all__ = ["parse_inference_query", "analyze_script", "AnalysisResult"]
