"""PySpark reproduction of "Evaluating Complex Queries on Streaming Graphs"
(Pacaci, Bonifati, Özsu — ICDE 2022). See DESIGN.md for the component map."""
