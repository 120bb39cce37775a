"""Subpackage of the Metam reproduction — see DESIGN.md."""
