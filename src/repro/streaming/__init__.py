"""Streaming ingestion (S9): micro-batch slicing of an event DataFrame
and a real Structured Streaming adaptive CEP operator."""
