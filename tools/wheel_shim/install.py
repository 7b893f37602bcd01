"""Install the offline `wheel` shim into the active site-packages.

Idempotent. Copies the shim package and writes a dist-info with the
``distutils.commands`` entry point so setuptools discovers the
``bdist_wheel`` command. Run once per container:

    python tools/wheel_shim/install.py
"""
from __future__ import annotations

import shutil
import site
import sys
from pathlib import Path

SHIM = Path(__file__).resolve().parent / "wheel"
VERSION = "0.45.0+local.shim"


def main() -> int:
    sp = Path(site.getsitepackages()[0])
    # Drop the script's own directory from sys.path so the check below
    # sees only an *installed* wheel, not the shim source next door.
    sys.path = [p for p in sys.path if Path(p or ".").resolve() != SHIM.parent]
    try:
        import wheel  # noqa: F401  (already present — nothing to do)

        print(f"wheel already importable from {wheel.__file__}; skipping")
        return 0
    except ImportError:
        pass
    dest = sp / "wheel"
    shutil.copytree(SHIM, dest, dirs_exist_ok=True)
    di = sp / f"wheel-{VERSION}.dist-info"
    di.mkdir(exist_ok=True)
    (di / "METADATA").write_text(
        "Metadata-Version: 2.1\n"
        "Name: wheel\n"
        f"Version: {VERSION}\n"
        "Summary: minimal offline wheel shim (see tools/wheel_shim)\n"
    )
    (di / "entry_points.txt").write_text(
        "[distutils.commands]\nbdist_wheel = wheel.bdist_wheel:bdist_wheel\n"
    )
    (di / "INSTALLER").write_text("tools/wheel_shim/install.py\n")
    (di / "RECORD").write_text(
        "".join(
            f"{p.relative_to(sp)},,\n"
            for p in sorted([*dest.rglob("*"), *di.iterdir()])
            if p.is_file()
        )
    )
    print(f"installed wheel shim -> {dest}")
    return 0


if __name__ == "__main__":
    sys.exit(main())
