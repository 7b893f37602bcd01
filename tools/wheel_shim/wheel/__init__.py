"""Minimal offline stand-in for the `wheel` package.

The reproduction container has no network and its package index blocks
`wheel`, but setuptools 65's PEP 660 editable-install path imports
`wheel.wheelfile.WheelFile` and the `bdist_wheel` command. This shim
implements exactly the surface setuptools' `editable_wheel` command
uses (get_tag / write_wheelfile / WheelFile with RECORD generation), so
`pip install -e .` works offline. Install with
`python tools/wheel_shim/install.py` (idempotent).
"""
__version__ = "0.45.0+local.shim"
