"""One module per evaluation table (DESIGN §5): each exposes ``run(...)``
returning a pandas DataFrame with the table's rows, shared by the
``jobs/`` entrypoints and the ``benchmarks/`` suite."""
